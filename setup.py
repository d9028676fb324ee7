"""Legacy setup shim.

The container is offline and has no ``wheel`` package, so PEP 517 editable
installs fail (``invalid command 'bdist_wheel'``). This shim lets
``pip install -e . --no-build-isolation`` fall back to
``setup.py develop``, which needs only setuptools. Metadata lives in
pyproject.toml.
"""
from setuptools import setup

setup()
