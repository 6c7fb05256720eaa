"""Legacy-path setup shim.

The container has no network and no `wheel` package, so PEP 517 editable
installs (which build an editable wheel) fail. With this setup.py present,
``pip install -e . --no-use-pep517 --no-build-isolation`` takes the legacy
``setup.py develop`` path, which needs only setuptools.
"""
from setuptools import setup

setup()
