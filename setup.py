"""Shim for offline editable installs.

The container has no network, so pip cannot fetch ``wheel`` and the PEP-517
editable path fails with ``invalid command 'bdist_wheel'``.  A ``setup.py``
lets ``pip install -e . --no-build-isolation`` fall back to the legacy
``develop`` route, which needs nothing beyond setuptools.
"""
from setuptools import setup

setup()
