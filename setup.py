"""Legacy-path shim: the container is offline and lacks `wheel`, so PEP
660 editable installs fail; `pip install -e . --no-build-isolation`
falls back to `setup.py develop` through this file."""
from setuptools import setup

setup()
