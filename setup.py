"""Legacy setup shim: this offline container lacks the `wheel` package, so
PEP 660 editable installs fail; `pip install -e . --no-use-pep517` (or plain
`pip install -e .` once pip falls back) uses this file instead."""
from setuptools import setup

setup()
