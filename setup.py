"""Thin setup.py: lets `pip install -e .` use the legacy develop path.

The container has no network and no `wheel` package, so PEP-517 editable
installs (which build a wheel) fail; metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
