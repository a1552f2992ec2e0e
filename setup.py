"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP 517 editable
installs (which build a wheel) fail. ``pip install -e . --no-use-pep517``
takes the legacy ``setup.py develop`` path, which needs only setuptools.
A ``pip.conf``-free convenience wrapper: ``make install`` or just
``pip install -e . --no-use-pep517 --no-build-isolation``.
"""
from setuptools import setup

setup()
