"""Shim for legacy editable installs.

The container is offline and has setuptools 65.5 but no ``wheel`` package,
so PEP 660 editable installs (which must build a wheel) fail with
``invalid command 'bdist_wheel'``. ``pip install -e .`` works through the
legacy ``setup.py develop`` path instead (pip falls back automatically when
told not to use PEP 517, and modern setuptools reads the [project] table in
pyproject.toml for metadata). See README for the exact install command.
"""
from setuptools import setup

setup()
