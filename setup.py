"""Thin setup.py so `pip install -e .` works offline.

The container has no network and no `wheel` package, so pip's default
PEP 660 editable build (which requires bdist_wheel) fails. This file
enables the legacy `setup.py develop` editable path:

    pip install -e . --no-build-isolation --no-use-pep517

Metadata lives in pyproject.toml; this only bridges the installer.
"""
from setuptools import setup

setup()
