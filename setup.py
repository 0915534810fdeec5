"""Legacy setup shim.

The offline sandbox has setuptools but no `wheel` package, so PEP-517
editable installs (which build a wheel) fail. `pip install -e .
--no-use-pep517` takes the `setup.py develop` path, which needs only
setuptools. Metadata lives in pyproject.toml; this file only enables
that fallback.
"""
from setuptools import setup

setup()
