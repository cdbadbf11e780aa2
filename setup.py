"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP 660
editable wheels (``pip install -e .``) cannot be built. ``python
setup.py develop`` installs an egg-link without needing wheel; pytest
additionally has ``pythonpath = ["src"]`` so tests run either way.
"""
from setuptools import setup

setup()
