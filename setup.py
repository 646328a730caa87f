"""Legacy setuptools shim.

The container is offline and has no ``wheel`` package, so pip's PEP 660
editable build (which shells out to ``bdist_wheel``) cannot run. With this
shim, ``pip install -e . --no-build-isolation`` (or ``python setup.py
develop``) uses the legacy editable path that needs no wheel.
"""
from setuptools import setup

setup()
