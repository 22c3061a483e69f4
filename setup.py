"""Setuptools shim.

The container has no network and no ``wheel`` package, so PEP 660
editable installs (which must build a wheel) fail. This shim lets
``pip install -e . --no-use-pep517`` take the legacy ``setup.py
develop`` path, which needs nothing beyond setuptools.
"""
from setuptools import setup

setup()
