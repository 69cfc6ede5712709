"""Legacy-path shim: the sandbox has no network for build isolation and
no `wheel` package, so `pip install -e .` needs `--no-use-pep517`/this
setup.py to take the setuptools develop route. All metadata lives in
pyproject.toml."""
from setuptools import setup

setup()
