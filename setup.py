"""Setuptools shim.

The sandboxed package index provides no ``wheel`` distribution, so the
PEP-517 editable path (which shells out to ``bdist_wheel``) fails.
This shim lets ``pip install -e . --no-build-isolation --no-use-pep517``
fall back to the classic ``setup.py develop`` flow; all metadata lives
in pyproject.toml.
"""
from setuptools import setup

setup()
