"""Legacy-editable-install shim: the sandbox has setuptools but no
`wheel`, so PEP 660 editable installs fail; `pip install -e .` falls
back to `setup.py develop` via this file (config lives in pyproject)."""
from setuptools import setup

setup()
