"""Legacy setup shim.

The container ships setuptools 65 without the ``wheel`` package and has
no network, so PEP-517 editable installs (which must build a wheel)
fail. This shim lets ``pip install -e . --no-use-pep517`` (and plain
``pip install -e .`` via the fallback documented in README) use the
legacy ``setup.py develop`` path. Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
