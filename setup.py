"""Legacy setup shim.

The offline environment has setuptools but no ``wheel`` package, so
PEP-660 editable installs fail. ``pip install -e . --no-use-pep517``
(or plain ``pip install -e .`` once pip falls back) uses this file via
``setup.py develop``, which needs no wheel build.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
