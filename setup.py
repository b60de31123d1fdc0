"""Legacy setup shim: the container has no `wheel` package and no network,
so PEP 517 editable installs fail; `pip install -e . --no-build-isolation`
falls back to `setup.py develop` through this file."""
from setuptools import setup

setup()
