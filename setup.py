"""Legacy setup shim: the container has no network and no `wheel`
package, so `pip install -e . --no-use-pep517` needs this file."""
from setuptools import setup

setup()
