"""Setuptools entrypoint.

The container is offline and has setuptools but not ``wheel``; a PEP 660
editable install needs ``bdist_wheel``, so we keep a classic setup.py and
no [build-system] table, which makes ``pip install -e .`` take the legacy
``setup.py develop`` path that works without wheel.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    python_requires=">=3.11",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
)
