"""Legacy setup shim.

The container ships setuptools 65.5 without the ``wheel`` package and has
no network, so pip's PEP-517 editable path (which must build an editable
wheel) fails with ``invalid command 'bdist_wheel'``. ``python setup.py
develop`` installs an egg-link instead, which needs no wheel. All
metadata lives in pyproject.toml; this file only enables the legacy path.
"""
from setuptools import setup

setup()
