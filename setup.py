"""Shim for offline editable installs.

The container has no network and no ``wheel`` package, so PEP-517 editable
installs (which build a wheel) fail. ``pip install -e . --no-build-isolation
--no-use-pep517`` takes the legacy setuptools ``develop`` path through this
file instead. Configuration lives in pyproject.toml.
"""
from setuptools import setup

setup()
