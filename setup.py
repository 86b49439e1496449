"""Shim so `pip install -e .` works offline.

The container has setuptools but no `wheel` package and no network, so
the PEP-517 editable path (which builds a wheel) fails. This shim lets
pip fall back to `setup.py develop`; all metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
