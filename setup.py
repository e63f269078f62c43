"""Setuptools shim.

The container is offline and has no ``wheel`` package, so PEP 517
editable installs (which build an editable wheel) fail. This shim lets
``pip install -e . --no-use-pep517 --no-build-isolation`` use the legacy
``setup.py develop`` path. Configuration lives in pyproject.toml.
"""
from setuptools import setup

setup()
