"""Legacy setup shim: the sandbox has no `wheel` package, so modern
PEP-660 editable installs (which build a wheel) fail; `setup.py
develop` installs an egg-link without needing wheel."""
from setuptools import setup

setup()
