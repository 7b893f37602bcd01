"""Legacy setuptools entrypoint.

The offline sandbox lacks the ``wheel`` package, which the PEP 517
editable-install path of setuptools 65 requires (``bdist_wheel``). This
shim lets ``pip install -e . --no-use-pep517`` (and plain
``pip install -e .`` once pip falls back) work fully offline; all
metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
