"""Legacy setup shim.

The container has setuptools but no ``wheel`` package and no network,
so PEP-517 editable installs (which build a wheel) fail. This shim
lets ``pip install -e . --no-use-pep517 --no-build-isolation`` use the
``setup.py develop`` path, which needs neither. Metadata lives in
pyproject.toml; setuptools merges it.
"""
from setuptools import setup

setup()
