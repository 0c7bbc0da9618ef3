"""Setup shim for environments without the ``wheel`` package.

The offline container lacks ``wheel``, which PEP 517 editable installs
require (``error: invalid command 'bdist_wheel'``). With this shim,
``pip install -e . --no-build-isolation --no-use-pep517`` uses the legacy
``setup.py develop`` path, which needs neither network nor wheel.
"""
from setuptools import setup

setup()
