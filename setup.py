"""Shim for offline editable installs.

The container has no network and no `wheel` package, so PEP-517 editable
installs (`pip install -e .`) cannot build the editable wheel. This shim
lets `pip install -e . --no-use-pep517 --no-build-isolation` (legacy
`setup.py develop`) work; metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
