"""Setuptools shim.

The container is offline and has setuptools but no ``wheel`` package, so
PEP-517 editable installs (which build a wheel) cannot run. This shim plus
the pip config (``no-use-pep517`` / ``no-build-isolation``) lets the plain
``pip install -e .`` workflow from the project brief succeed via the
legacy ``setup.py develop`` path. Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
