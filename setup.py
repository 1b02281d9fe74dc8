"""Legacy setup shim: the container lacks the `wheel` package (offline), so
PEP 660 editable installs fail; `pip install -e . --no-use-pep517` uses this."""
from setuptools import setup

setup()
