"""Legacy setup shim.

The offline container has setuptools but not ``wheel``, so pip's
PEP 517 editable path (which shells out to ``bdist_wheel``) fails.
With this shim, ``pip install -e . --no-use-pep517 --no-build-isolation``
uses the classic ``setup.py develop`` route, which needs no wheel.
All metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
