"""Setup shim: lets `pip install -e .` use the legacy editable path.

The container has no network and no `wheel` package, so PEP-517 editable
installs (which need bdist_wheel) fail; `--no-use-pep517` with this shim
works offline. Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
