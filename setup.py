"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP-517
editable installs (which build a wheel) fail. ``pip install -e .
--no-use-pep517 --no-build-isolation`` uses this file's legacy
``develop`` path instead, which needs only setuptools. Plain
``pip install -e .`` also works once ``wheel`` is available.
"""
from setuptools import setup

setup()
