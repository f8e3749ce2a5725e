"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP 517/660
editable installs (which shell out to ``bdist_wheel``) cannot work.
Keeping a ``setup.py`` and omitting ``[build-system]`` from pyproject.toml
routes ``pip install -e .`` through setuptools' legacy develop path, which
needs nothing beyond the preinstalled setuptools.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
