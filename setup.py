"""Setup shim: the container has no network and no `wheel` package, so
PEP-517 editable installs (which shell out to bdist_wheel) fail.  With
this file present, `pip install -e . --no-build-isolation --no-use-pep517`
uses setuptools' legacy develop path, which needs nothing extra.
Configuration lives in pyproject.toml.
"""
from setuptools import setup

setup()
