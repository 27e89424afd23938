"""Setup shim.

The container has no network and no `wheel` package, so PEP-517 editable
installs (which require bdist_wheel) fail. This file lets
``pip install -e . --no-use-pep517 --no-build-isolation`` (and plain
``pip install -e .`` with older pip fallbacks) use the legacy
setuptools-develop path. Configuration lives in pyproject.toml.
"""
from setuptools import setup

setup()
