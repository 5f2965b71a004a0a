"""Legacy installer shim.

The container has no network and no ``wheel`` package, so PEP 660
editable installs (``pip install -e .``) cannot build the editable wheel.
``python setup.py develop`` (or ``pip install -e . --no-build-isolation``
once wheel is present) installs the same package; metadata lives in
pyproject.toml.
"""
from setuptools import setup

setup()
