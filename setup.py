"""Legacy-install shim: the container has setuptools 65 but no `wheel`
package and no network, so PEP-517 editable installs fail on
`bdist_wheel`. `pip install -e . --no-build-isolation --no-use-pep517`
goes through this file instead."""
from setuptools import setup

setup()
