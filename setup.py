"""Legacy setup shim.

The container has no network, so pip cannot fetch the ``wheel`` package
that PEP-517 editable installs require. With this file present,
``pip install -e . --no-build-isolation`` (or ``--no-use-pep517``) falls
back to ``setup.py develop``, which needs only setuptools.
"""
from setuptools import setup

setup()
