"""Setuptools shim for environments without PEP 660 support.

The primary install path is ``pip install -e .`` via pyproject.toml (the
offline sandbox resolves the build dependencies from local wheels via a
``find-links`` entry in pip.conf). This file additionally enables the
legacy ``python setup.py develop`` fallback on machines whose pip/wheel
combination cannot do isolated editable builds.
"""
from setuptools import setup

setup()
