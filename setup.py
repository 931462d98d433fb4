"""Legacy setup shim.

The sandbox has setuptools but not the ``wheel`` package, so PEP-517
editable installs (which need ``bdist_wheel``) fail offline. This shim
lets ``pip install -e .`` fall back to ``setup.py develop``.
"""
from setuptools import setup

setup()
