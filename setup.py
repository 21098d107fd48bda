"""Legacy setup shim.

The sandbox has setuptools without the ``wheel`` package and no network,
so PEP-517 editable installs fail on ``bdist_wheel``. ``pip install -e .``
is configured (setup.cfg / pip env) to take the legacy ``setup.py
develop`` path, which needs only this shim.
"""
from setuptools import setup

setup()
