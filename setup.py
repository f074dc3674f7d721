"""Shim enabling legacy editable installs in offline environments.

The container has no network and no ``wheel`` package, so PEP-660
editable installs (which build a wheel) fail. ``pip install -e .``
falls back to ``setup.py develop`` through this shim:

    pip install -e . --no-build-isolation --no-use-pep517
"""
from setuptools import setup

setup()
