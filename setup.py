"""Legacy setup shim.

The container is fully offline and has no `wheel` package, so PEP 660
editable installs (which must build a wheel) cannot run. With no
[build-system] table in pyproject.toml, pip falls back to the legacy
`setup.py develop` path, which works offline. Metadata lives in
pyproject.toml; this file only triggers the fallback.
"""
from setuptools import setup

setup()
