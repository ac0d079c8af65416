"""Legacy setup shim.

The container has no ``wheel`` package and no network, so the PEP-517
editable build (which shells out to ``bdist_wheel``) cannot run.  With
this shim, ``pip install -e . --no-use-pep517 --no-build-isolation``
(see README) takes the classic ``setup.py develop`` path, which needs
only setuptools.  Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
