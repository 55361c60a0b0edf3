"""Setuptools entry point.

The offline container has setuptools but not the ``wheel`` package, so
PEP-660 editable installs fail; this setup.py lets ``pip install -e .``
take the legacy ``setup.py develop`` path (run pip with
``--no-build-isolation`` if your pip tries to download build deps).
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
