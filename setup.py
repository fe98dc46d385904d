"""Legacy setup shim.

The sandbox has setuptools but no ``wheel`` package and no network, so
PEP 517 editable installs fail with "invalid command 'bdist_wheel'".
This file lets ``pip install -e .`` fall back to the classic
``setup.py develop`` path (pip picks it automatically when the PEP 517
route errors; ``--no-use-pep517`` forces it). Metadata lives in
pyproject.toml; this only mirrors the package layout.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
