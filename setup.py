"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP 517/660
editable installs (which shell out to ``bdist_wheel``) fail.  With no
``[build-system]`` table in pyproject.toml, ``pip install -e .`` falls back
to ``setup.py develop``, which only needs setuptools.  Package metadata is
read from pyproject.toml's ``[project]`` table by setuptools itself.
"""
from setuptools import setup

setup()
