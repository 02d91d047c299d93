"""Legacy shim: this offline container lacks the `wheel` package, so
`pip install -e . --no-use-pep517` (setup.py develop) is the install path."""
from setuptools import setup

setup()
