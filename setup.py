"""Shim so legacy (non-PEP-660) editable installs work offline.

The container has no network and no `wheel` package, so pip's PEP 660
editable build (which needs bdist_wheel) fails; `setup.py develop` does
not. Configuration lives in pyproject.toml.
"""
from setuptools import setup

setup()
