"""Legacy setup shim.

The container has setuptools 65.5 without the ``wheel`` package and no
network, so PEP-660 editable installs fail (`invalid command
'bdist_wheel'`). This shim lets ``pip install -e .`` fall back to the
legacy ``setup.py develop`` path; all metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
