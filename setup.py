"""Shim so `pip install -e .` works offline.

The container has no network and no `wheel` package, so PEP-517
editable installs (which require bdist_wheel) fail. This file enables
the legacy `setup.py develop` path:

    pip install -e . --no-build-isolation --no-use-pep517

Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
