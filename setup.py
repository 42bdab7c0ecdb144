"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP-660
editable installs (which need ``bdist_wheel``) fail. This shim lets
``pip install -e . --no-build-isolation --no-use-pep517`` take the
setuptools ``develop`` path, which only needs setuptools. All metadata
lives in ``pyproject.toml``.
"""
from setuptools import setup

setup()
