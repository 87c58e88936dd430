"""Legacy setup shim.

The container is offline and has setuptools but no ``wheel`` package, so
PEP-660 editable installs (which build a wheel) fail.  This shim lets
``pip install -e . --no-use-pep517 --no-build-isolation`` fall back to
``setup.py develop``, which needs neither network nor wheel.
"""
from setuptools import setup

setup()
