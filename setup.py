"""Legacy setup shim.

The container is offline and has no `wheel` package, so pip's PEP 517
editable build (which shells out to `bdist_wheel`) cannot run. With this
file present, `pip install -e .` falls back to `setup.py develop`
(combined with `no-use-pep517`/`no-build-isolation`, set in ~/.config/pip/pip.conf),
which needs neither network nor wheel. Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
