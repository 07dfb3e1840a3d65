"""Setuptools shim: the container is offline and lacks the `wheel` package,
so the PEP 660 editable path (`bdist_wheel`) is unavailable; this enables
`pip install -e . --no-use-pep517 --no-build-isolation` (and plain
`pip install -e .` falls back to it on failure — see README)."""
from setuptools import setup

setup()
