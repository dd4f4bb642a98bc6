"""Shim for legacy editable installs in the offline container.

The container has setuptools but no ``wheel`` and no network, so the
PEP-517 editable path (which builds a wheel) fails. ``pip install -e .
--no-build-isolation --no-use-pep517`` uses this shim via
``setup.py develop`` instead. Configuration lives in pyproject.toml.
"""
from setuptools import setup

setup()
