"""Legacy setup shim.

The sandbox has no ``wheel`` package, so PEP-660 editable installs cannot
build; this file enables ``pip install -e . --no-use-pep517
--no-build-isolation`` (configured globally in /root/.config/pip/pip.conf
so a plain ``pip install -e .`` works).
"""
from setuptools import setup

setup()
