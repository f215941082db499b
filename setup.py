"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP-660
editable installs (which shell out to ``bdist_wheel``) fail. This shim
lets ``pip install -e . --no-use-pep517 --no-build-isolation`` take the
legacy ``setup.py develop`` path, which needs only setuptools.
"""
from setuptools import setup

setup()
