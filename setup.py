"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP 660 editable
installs (``pip install -e .``) cannot build. ``python setup.py develop``
installs the package in editable mode with setuptools alone.
"""
from setuptools import setup

setup()
