"""Legacy setup shim.

The container is offline and has setuptools but no ``wheel`` package, so
PEP 517 editable installs (which build a wheel) fail. This shim lets
``pip install -e . --no-build-isolation --no-use-pep517`` (or plain
``python setup.py develop``) install the package without network access.
"""
from setuptools import setup

setup()
