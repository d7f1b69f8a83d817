"""Shim for legacy editable installs (`pip install -e . --no-use-pep517`).

The container has no network and no `wheel` package, so the PEP-660
editable path (which builds a wheel) is unavailable; this file lets
`setup.py develop` handle `pip install -e .` instead. All metadata
lives in pyproject.toml.
"""
from setuptools import setup

setup()
