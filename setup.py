"""Legacy setup shim.

The container's package index cannot serve ``wheel``, so PEP 660 editable
installs (which need ``bdist_wheel`` under setuptools<70) fail. This shim
lets ``pip install -e . --no-use-pep517`` (and plain ``pip install -e .``
once pip falls back) perform a classic ``setup.py develop`` install.
"""
from setuptools import setup

setup()
