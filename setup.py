"""setup.py shim.

The container is offline and has setuptools but no ``wheel`` package, so
PEP-517 editable installs fail with ``invalid command 'bdist_wheel'``. This
shim lets ``pip install -e . --no-use-pep517 --no-build-isolation`` (legacy
``setup.py develop``) work; all metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
