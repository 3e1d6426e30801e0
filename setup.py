"""Legacy setup shim: the offline container lacks the `wheel` package, so
PEP 517 editable installs fail; this enables `pip install -e .` via the
legacy setuptools develop path."""
from setuptools import setup

setup()
