"""Setuptools entry point.

The container has no network and no ``wheel`` package, so pip's PEP 660
editable path (which shells out to ``bdist_wheel``) cannot run. Keeping a
``setup.py`` and no ``[build-system]`` table lets
``pip install -e . --no-build-isolation`` (and plain ``pip install -e .``)
use the legacy ``setup.py develop`` route, which works offline.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
