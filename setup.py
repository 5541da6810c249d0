"""Shim for offline editable installs.

The container has no network and no ``wheel`` package, so PEP 660 editable
installs (which must build a wheel) fail. With this file present,
``pip install -e .`` falls back to ``setup.py develop``, which needs only
setuptools. Configuration lives in pyproject.toml.
"""
from setuptools import setup

setup()
