"""Shim for environments without the `wheel` package: enables
`pip install -e . --no-build-isolation` and `python setup.py develop`."""
from setuptools import setup

setup()
