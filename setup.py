"""Shim for offline editable installs.

The container has no network and no ``wheel`` package, so pip's PEP-517
editable path (which shells out to ``bdist_wheel``) cannot run. Metadata
lives in ``pyproject.toml``; this file only exists so
``pip install -e . --no-build-isolation --no-use-pep517`` (see README)
can fall back to ``setup.py develop``.
"""
from setuptools import setup

setup()
