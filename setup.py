"""Legacy setup shim: the container has no network and no `wheel` package,
so PEP-660 editable installs fail; `pip install -e . --no-use-pep517
--no-build-isolation` (or plain `pip install -e .` with a new enough pip)
uses this file instead. Configuration lives in pyproject.toml."""
from setuptools import setup

setup()
