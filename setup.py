"""Legacy setup shim.

The offline container's package index has no ``wheel`` distribution, so
PEP 517 editable installs (``pip install -e .``) cannot build an editable
wheel. ``python setup.py develop`` installs the same egg-link without
needing ``wheel``. Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
