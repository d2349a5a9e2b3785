"""Thin setup.py shim.

The container has no network and no ``wheel`` package, so PEP-517 editable
installs (which build a wheel) fail. With this shim, ``pip install -e .
--no-build-isolation`` falls back to the legacy ``setup.py develop`` path,
which needs only setuptools. All metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
