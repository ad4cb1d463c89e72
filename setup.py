"""Legacy setup shim.

The container has no network and no ``wheel`` package, so pip's PEP 517
editable path (which must build a wheel) fails. With no ``[build-system]``
table in pyproject.toml, pip falls back to ``setup.py develop``, which
works offline. Metadata lives in pyproject.toml's ``[project]`` table.
"""
from setuptools import setup

setup()
