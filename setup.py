"""Legacy setup shim — see the note in pyproject.toml.

The container has no network and no `wheel` package, so PEP 660 editable
installs fail at `bdist_wheel`. This file lets `pip install -e .` take the
legacy `setup.py develop` path instead.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
