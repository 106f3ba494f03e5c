"""Legacy setup shim: the offline container has no `wheel` package, so
PEP-517 editable installs (which must build a wheel) fail; `pip install -e .
--no-use-pep517` / `setup.py develop` works without it."""
from setuptools import setup

setup()
