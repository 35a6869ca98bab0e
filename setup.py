"""Legacy setup shim.

The container has no network and no `wheel` package, so PEP 517/660
editable builds (which need bdist_wheel) cannot run.  This shim plus the
pip config (~/.config/pip/pip.conf: no-build-isolation / no-use-pep517)
lets plain `pip install -e .` take the legacy setuptools develop path.
"""
from setuptools import setup

setup()
