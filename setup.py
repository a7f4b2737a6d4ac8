"""Shim for offline editable installs: the container ships setuptools but
not `wheel`, so PEP 660 editable builds (which wheel-pack) fail; the
legacy `setup.py develop` path used for setup.py projects needs no wheel."""
from setuptools import setup

setup()
