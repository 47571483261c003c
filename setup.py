"""Shim for legacy editable installs.

The container has setuptools but no ``wheel`` package, so PEP 660
editable installs (which build a wheel) fail. ``pip install -e .`` is
configured via setup.cfg/pyproject; this file lets pip fall back to
``setup.py develop`` which needs no wheel.
"""
from setuptools import setup

setup()
