"""Legacy setup shim: the offline container lacks the `wheel` package, so
PEP 660 editable installs fail; `setup.py develop` works without it."""
from setuptools import setup

setup()
