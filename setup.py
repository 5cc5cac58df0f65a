"""Legacy setup shim.

The container ships setuptools 65 without the ``wheel`` package and has
no network, so PEP 660 editable installs (which need ``bdist_wheel``)
fail. ``pip install -e . --no-use-pep517 --no-build-isolation`` goes
through this shim via ``setup.py develop`` instead. All metadata lives
in pyproject.toml.
"""
from setuptools import setup

setup()
