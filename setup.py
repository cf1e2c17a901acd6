"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP-660
editable installs (which build a wheel) fail. This shim enables the
legacy ``setup.py develop`` editable path; metadata lives in
pyproject.toml.
"""
from setuptools import setup

setup()
