"""Legacy setup shim: lets ``pip install -e .`` work without the
``wheel`` package (offline container). Metadata lives in pyproject.toml."""
from setuptools import setup

setup()
