"""Setuptools entrypoint.

The offline container has setuptools but not the ``wheel`` package, so
PEP 660 editable installs (which build an editable wheel) cannot run.
Keeping the metadata here and leaving ``[build-system]`` out of
pyproject.toml routes ``pip install -e .`` through the legacy
``setup.py develop`` path, which works without ``wheel``.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
