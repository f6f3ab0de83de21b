"""Legacy setup shim.

The container is offline and has no ``wheel`` package, so PEP 660 editable
installs (which build a wheel) fail. This shim lets
``pip install -e . --no-build-isolation --no-use-pep517`` take the
``setup.py develop`` path instead. Configuration lives in pyproject.toml.
"""
from setuptools import setup

setup()
