"""Legacy-path shim for offline editable installs.

The container has no network and no `wheel` package, so pip's PEP 660
editable build (which shells out to bdist_wheel) fails. With no
[build-system] table in pyproject.toml and this setup.py present,
`pip install -e .` uses the legacy `setup.py develop` path instead.
Metadata lives in pyproject.toml's [project] table (setuptools >= 61
reads it from here too).
"""
from setuptools import setup

setup()
