"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP-517
editable installs fail (``invalid command 'bdist_wheel'``). This shim
lets ``pip install -e . --no-build-isolation --no-use-pep517`` (and a
plain ``pip install -e .`` on a machine with wheel) work; metadata lives
in pyproject.toml.
"""
from setuptools import setup

setup()
