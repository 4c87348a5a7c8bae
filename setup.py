"""Legacy setup shim.

This container has no network and no ``wheel`` package, so PEP 660
editable installs (which build a wheel) fail. Keeping a ``setup.py``
and no ``[build-system]`` table lets ``pip install -e .`` use the
legacy ``setup.py develop`` path, which works offline.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
