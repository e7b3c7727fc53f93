"""Shim for legacy editable installs.

The container has no network and no ``wheel`` package, so PEP 517 editable
installs fail at ``bdist_wheel``. ``pip install -e . --no-use-pep517
--no-build-isolation`` (or plain ``pip install -e .`` with a pip that falls
back) uses this file instead. Configuration lives in pyproject.toml.
"""
from setuptools import setup

setup()
