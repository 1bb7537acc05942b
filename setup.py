"""Legacy-editable-install shim.

The offline environment has no ``wheel`` package, so PEP-517 editable
installs fail with "invalid command 'bdist_wheel'". This setup.py lets
``pip install -e . --no-build-isolation --no-use-pep517`` fall back to
``setup.py develop``, which needs only setuptools. Metadata lives in
pyproject.toml; setuptools merges it.
"""
from setuptools import setup

setup()
