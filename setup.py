"""Legacy setup shim: this container has no `wheel` package and no network,
so PEP-517 editable builds (which need bdist_wheel) fail. `pip install -e .`
is redirected to the classic `setup.py develop` path via setup.cfg below."""
from setuptools import setup

setup()
