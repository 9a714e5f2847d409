"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP-517
editable installs (which need ``bdist_wheel``) fail; ``pip install -e .
--no-use-pep517`` / ``setup.py develop`` works with the stock
setuptools. Configuration lives in pyproject.toml.
"""
from setuptools import setup

setup()
