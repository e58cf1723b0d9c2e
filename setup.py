"""Legacy setup shim.

The offline container has no ``wheel`` package, so PEP 660 editable installs
(``setuptools.build_meta`` → ``editable_wheel``) fail with
``invalid command 'bdist_wheel'``. This shim enables the legacy
``setup.py develop`` path: ``pip install -e . --no-use-pep517``.
Project metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
