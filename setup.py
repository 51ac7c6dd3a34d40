"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP-517
editable installs (which build a *.dist-info via bdist_wheel) fail.
``pip install -e . --no-build-isolation`` falls back to
``setup.py develop`` through this shim, which needs only setuptools.
"""
from setuptools import setup

setup()
