"""Legacy setup shim.

The sandbox has setuptools but no ``wheel`` package and no network, so
PEP 660 editable installs (which build an editable wheel) fail with
"invalid command 'bdist_wheel'". This shim lets
``pip install -e . --no-use-pep517`` take the setup.py develop path.
Project metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
