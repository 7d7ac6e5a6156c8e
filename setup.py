"""Legacy setuptools entry point.

Kept because the container is offline without the ``wheel`` package: the
modern PEP-660 editable route fails, while ``pip install -e .`` through this
file uses ``setup.py develop`` which needs nothing beyond setuptools.
Metadata lives in pyproject.toml; this only mirrors the package layout.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
