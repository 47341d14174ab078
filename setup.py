"""Shim for legacy editable installs in offline environments without the
``wheel`` package: ``pip install -e . --no-build-isolation --no-use-pep517``.
All metadata lives in pyproject.toml."""
from setuptools import setup

setup()
