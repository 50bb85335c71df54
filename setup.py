"""Setuptools shim: enables legacy editable installs in this offline
container (no `wheel` package, so PEP-517 editable wheels can't build)."""
from setuptools import setup

setup()
