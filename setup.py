"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP 517 editable
builds (which need ``bdist_wheel``) fail. This shim lets
``pip install -e .`` fall back to ``setup.py develop``.
"""
from setuptools import setup

setup()
