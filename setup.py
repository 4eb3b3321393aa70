"""Legacy setup shim.

The offline container has no ``wheel`` package, so pip's PEP-517 editable
path (which builds a wheel) fails; this shim lets
``pip install -e . --no-build-isolation`` fall back to
``setup.py develop``, which needs only setuptools. Configuration lives in
pyproject.toml.
"""
from setuptools import setup

setup()
