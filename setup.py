"""Legacy setup shim.

The environment has no ``wheel`` distribution, so PEP 660 editable
installs (which build a wheel) cannot work; this shim lets
``pip install -e .`` fall back to ``setup.py develop``. All metadata
lives in pyproject.toml and is read by setuptools.
"""
from setuptools import setup

setup()
