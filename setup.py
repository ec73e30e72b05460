"""Setuptools shim.

This container has setuptools but not the ``wheel`` package and no network,
so PEP 517 builds (``pip install -e .``) cannot produce an editable wheel.
``python setup.py develop`` installs via egg-link instead, which needs only
setuptools. Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
