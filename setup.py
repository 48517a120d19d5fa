"""Legacy-editable-install shim.

The container has no package index, and the preinstalled setuptools
needs the (absent) ``wheel`` package for PEP 517 editable installs.
With this setup.py and ``no-use-pep517`` (set in the pip config),
``pip install -e .`` takes the legacy ``setup.py develop`` path, which
works fully offline.
"""
from setuptools import setup

setup()
