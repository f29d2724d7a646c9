"""Legacy setup shim.

The container has setuptools 65 but no ``wheel`` package, so pip cannot
build PEP 660 editable wheels.  With this shim (and no ``[build-system]``
table in pyproject.toml) ``pip install -e .`` falls back to
``setup.py develop``, which needs only setuptools.
"""
from setuptools import setup

setup()
