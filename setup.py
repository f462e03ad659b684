"""Legacy-editable-install shim.

The container has no network and no `wheel` package, so pip's PEP-660
editable path (which must build an editable wheel) cannot run. With this
setup.py, ``pip install -e . --no-use-pep517 --no-build-isolation`` (or
plain ``pip install -e .`` once pip falls back) uses `setup.py develop`,
which needs only setuptools.
"""
from setuptools import setup

setup()
