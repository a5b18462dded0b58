"""Legacy setup shim.

The container has no network and no ``wheel`` package, so pip's PEP-660
editable build (which shells out to ``bdist_wheel``) cannot run. This
shim lets ``pip install -e . --no-build-isolation --no-use-pep517``
fall back to ``setup.py develop``, which needs only setuptools.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
)
