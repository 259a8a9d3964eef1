"""Legacy setup shim.

The sandbox has no network and no `wheel` package, so PEP 660 editable
installs (which build an editable wheel) fail. `pip install -e .` is made to
work offline via this shim + the `--no-use-pep517`-equivalent legacy path that
pip falls back to when `setup.py` exists and wheel support is unavailable.
Configuration lives in pyproject.toml; this file only forwards to setuptools.
"""
from setuptools import setup

setup()
