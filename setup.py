"""Legacy setup shim: the container has no `wheel` package and no network,
so PEP 517 editable installs fail with `invalid command 'bdist_wheel'`.
`pip install -e . --no-build-isolation --no-use-pep517` uses this instead.
All real metadata lives in pyproject.toml."""
from setuptools import setup

setup()
