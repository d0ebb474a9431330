"""Legacy setup shim.

The container has no network and no ``wheel`` package, so the PEP-517
editable path (which builds a wheel) fails. This file lets
``pip install -e . --no-build-isolation --no-use-pep517`` (and plain
``pip install -e .`` with the pip defaults configured in this repo) fall
back to ``setup.py develop``, which needs no wheel build.
"""
from setuptools import setup

setup()
