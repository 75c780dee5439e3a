"""Setuptools shim.

The container has no network and no `wheel` package, so PEP-517
editable installs (which build a wheel) fail.  This setup.py enables
pip's legacy `setup.py develop` editable path:

    pip install -e . --no-use-pep517 --no-build-isolation

(`pip install -e .` alone also works once pip falls back to it.)
"""
from setuptools import setup

setup()
