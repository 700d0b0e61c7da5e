"""Shim for legacy editable installs: the container has no `wheel` package
and no network, so PEP 660 editable wheels cannot be built. `pip install -e .
--no-use-pep517` (or plain `pip install -e .` with pip configured below) uses
this setup.py via the legacy path."""
from setuptools import setup

setup()
