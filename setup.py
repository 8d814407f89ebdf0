"""Shim for offline editable installs.

The container has no network and no ``wheel`` package, so the PEP 517
editable path (which needs ``bdist_wheel``) fails. This file lets
``pip install -e . --no-use-pep517 --no-build-isolation`` (and plain
``pip install -e .``, which falls back automatically on some pips) use
the legacy ``setup.py develop`` route. Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
