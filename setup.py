"""Legacy setup shim: the sandbox has no network and no `wheel` package,
so PEP-517 editable builds fail; `pip install -e . --no-build-isolation`
falls back to this via --no-use-pep517 / setuptools develop."""
from setuptools import setup

setup()
