"""Fallback for environments without the `wheel` package (offline container):
`python setup.py develop` installs the same editable package that
`pip install -e .` would."""
from setuptools import setup

setup()
