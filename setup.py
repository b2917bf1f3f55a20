"""Shim for offline editable installs.

The container has no network and no ``wheel`` package, so the PEP-517
editable path (which builds a wheel) fails. ``pip install -e . 
--no-use-pep517 --no-build-isolation`` falls back to ``setup.py develop``,
which needs this file. Configuration lives in pyproject.toml.
"""
from setuptools import setup

setup()
