"""Setuptools shim so `pip install -e .` / `setup.py develop` work offline.

The container has no `wheel` package and no network, so PEP-660 editable
wheels cannot be built; `python setup.py develop` installs the same
`.pth`-based editable hook without needing `wheel`.
"""
from setuptools import setup

setup()
