"""Legacy setup shim.

The container is offline and has setuptools 65 without the ``wheel``
package, so PEP-517 editable installs (which build a wheel) fail. This
shim lets ``pip install -e . --no-build-isolation --no-use-pep517``
and plain ``pip install -e .`` (which falls back to it) succeed using
the legacy develop path. Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
