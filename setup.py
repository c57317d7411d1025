"""Legacy setuptools shim.

The container is offline: PEP-517/660 editable installs need the `wheel`
package, which cannot be fetched. With no [build-system] table in
pyproject.toml, `pip install -e .` falls back to `setup.py develop`,
which works with the preinstalled setuptools alone. Project metadata
lives in pyproject.toml ([project] table, read by setuptools>=61).
"""
from setuptools import setup

setup()
