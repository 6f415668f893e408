"""Shim for offline editable installs.

The container has setuptools 65 without the ``wheel`` package, so PEP 660
editable wheels cannot be built offline; the legacy ``setup.py develop``
path (selected via pip.conf: no-build-isolation + no-use-pep517) needs
this file. Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
