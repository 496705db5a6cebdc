"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP 660
editable installs (which must build a wheel) fail. ``pip install -e .
--no-use-pep517 --no-build-isolation`` — or plain ``pip install -e .``
via the pip.conf in this repo's README — takes the setup.py develop
path instead, which works offline. Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
