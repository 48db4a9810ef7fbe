"""Legacy setup shim: the sandbox has setuptools but no ``wheel``
package and no network, so PEP 517 editable installs fail; ``pip
install -e . --no-use-pep517 --no-build-isolation`` uses this instead.
Metadata lives in pyproject.toml."""
from setuptools import setup

setup()
