"""Shim for legacy editable installs: this offline container has no
``wheel`` package, so PEP 517 editable builds (which shell out to
``bdist_wheel``) fail; ``pip install -e . --no-use-pep517`` uses this.
"""
from setuptools import setup

setup()
