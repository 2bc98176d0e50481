"""Legacy setup shim.

The container has setuptools but not `wheel`, so PEP-517 editable
installs ("pip install -e .") fail building the editable wheel. This
shim lets pip use the legacy `setup.py develop` code path instead.
Configuration lives in pyproject.toml's [project] table.
"""
from setuptools import setup

setup()
