"""Shim for offline editable installs.

The container has setuptools 65 and no ``wheel`` package, so pip's PEP
660 editable build (which shells out to bdist_wheel) fails. ``python
setup.py develop`` — or ``pip install -e . --no-build-isolation`` once a
wheel backport exists — installs the package from pyproject metadata.
"""
from setuptools import setup

setup()
