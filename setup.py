"""Legacy setup shim.

The container has no network: pip cannot fetch ``wheel`` for PEP-660
editable builds, so ``pip install -e .`` must go through the legacy
``setup.py develop`` path (``--no-use-pep517 --no-build-isolation``
also works explicitly).
"""
from setuptools import setup

setup()
