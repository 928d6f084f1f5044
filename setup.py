"""Legacy setup shim.

The evaluation container is offline and lacks the ``wheel`` package, so
PEP-517 editable installs (`pip install -e .`) fail with
``invalid command 'bdist_wheel'``. This shim lets
``pip install -e . --no-build-isolation --no-use-pep517`` (or
``python setup.py develop``) succeed; the packaging metadata itself
lives in pyproject.toml.
"""
from setuptools import setup

setup()
