"""Legacy setup shim: the container has no `wheel` package and no network,
so PEP-517 editable builds (bdist_wheel) are unavailable; pip is configured
(~/.config/pip/pip.conf) to use the legacy `setup.py develop` path instead."""
from setuptools import setup

setup()
