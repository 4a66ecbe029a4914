"""Legacy setup shim.

The container's setuptools lacks the ``wheel`` package, so PEP-517
editable installs fail on ``bdist_wheel``; ``pip install -e . \
--no-use-pep517 --no-build-isolation`` through this shim works offline.
Configuration lives in pyproject.toml.
"""
from setuptools import setup

setup()
