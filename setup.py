"""Shim for offline editable installs (no `wheel` package in the container,
so PEP 517 editable builds fail with `invalid command 'bdist_wheel'`).
Metadata lives in pyproject.toml."""
from setuptools import setup

setup()
