"""Legacy setup shim.

The container has no network, so pip cannot fetch the ``wheel`` backend the
PEP 660 editable-install path needs. With this shim, ``pip install -e .``
falls back to the classic ``setup.py develop`` flow, which works offline.
"""
from setuptools import setup

setup()
