"""Legacy setup shim.

The container ships setuptools 65.5 without the ``wheel`` package, so
PEP-517 editable installs fail on ``bdist_wheel``. ``pip install -e .``
falls back to this via ``--no-use-pep517`` (see README). Configuration
lives in pyproject.toml.
"""
from setuptools import setup

setup()
