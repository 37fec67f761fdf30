"""Shim for offline editable installs.

The container has no network and no ``wheel`` package, so pip's PEP 660
editable path (which needs ``bdist_wheel``) fails. With this shim plus
``use-pep517 = false`` in pip's config (see README), ``pip install -e .``
takes the legacy ``setup.py develop`` path, which works offline.
Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
