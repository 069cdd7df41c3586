"""Legacy setup shim.

The container is offline and has setuptools 65 without the `wheel`
package, so PEP-517 editable installs fail at bdist_wheel. This shim
lets `pip install -e . --no-build-isolation --no-use-pep517` (setup.py
develop) work; metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
