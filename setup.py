"""Shim for offline editable installs.

This container has no network and no ``wheel`` package, so PEP 660 editable
installs (which build a wheel) fail; ``pip install -e . --no-use-pep517``
falls back to ``setup.py develop``, which works with the stock setuptools.
All metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
