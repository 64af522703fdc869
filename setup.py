"""Legacy setup shim.

This container has no network and no `wheel` package, so PEP 517/660
editable builds (which shell out to `bdist_wheel`) fail. With no
[build-system] table in pyproject.toml, pip falls back to
`setup.py develop`, which needs only setuptools. Package metadata still
comes from pyproject.toml's [project] table (setuptools >= 61 reads it).
"""
from setuptools import setup

setup()
