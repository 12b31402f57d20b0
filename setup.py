"""Shim for environments without the `wheel` package (no network):
pip's legacy editable path (`use-pep517 = false` in pip.conf) needs a
setup.py; all metadata lives in pyproject.toml."""
from setuptools import setup

setup()
