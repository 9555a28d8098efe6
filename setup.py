"""Legacy shim: this container has no `wheel` package, so PEP 660
editable installs fail with `invalid command 'bdist_wheel'`.  A setup.py
lets `pip install -e . --no-use-pep517` take the classic develop path.
Configuration lives in pyproject.toml."""
from setuptools import setup

setup()
