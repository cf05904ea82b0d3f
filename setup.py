"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP 660
editable installs (which build a wheel in an isolated env) cannot work.
With this shim plus ``no-use-pep517``/``no-build-isolation`` in the pip
config, ``pip install -e .`` takes the classic ``setup.py develop``
path, which needs neither. Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
