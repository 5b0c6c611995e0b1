"""Legacy setup shim.

The container is offline and lacks the ``wheel`` package, so the PEP 517
editable-install path is unavailable; this shim lets
``pip install -e .`` use the legacy ``setup.py develop`` route. Package
metadata lives in pyproject.toml.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
