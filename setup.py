"""Legacy setup shim.

The container is offline and has setuptools without ``wheel``, so PEP
660 editable installs (which build a wheel) fail. ``pip install -e .``
falls back to this legacy path (``--no-use-pep517`` also works).
Package metadata lives in pyproject.toml; setuptools>=61 reads it.
"""
from setuptools import setup

setup()
