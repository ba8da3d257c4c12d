"""Legacy setup shim: the container has no `wheel` package, so PEP 517
editable installs (which need bdist_wheel) fail; `setup.py develop` does
not.  Metadata lives in pyproject.toml."""
from setuptools import setup

setup()
