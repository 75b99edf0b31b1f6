"""Legacy setuptools entry point.

Exists so ``pip install -e . --no-build-isolation`` works in this
offline container: without the ``wheel`` package, PEP 660 editable
wheels cannot be built, and pip then falls back to
``setup.py develop`` — which needs this file. Metadata lives in
pyproject.toml; this only wires up the src/ layout.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
