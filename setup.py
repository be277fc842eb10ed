"""Packaging via setup.py (legacy editable path).

The container is fully offline and has setuptools but no ``wheel``
package, so PEP 660 editable installs (which build a wheel) fail.
Keeping the build metadata here — and no ``[build-system]`` table in
pyproject.toml — makes ``pip install -e .`` take the ``setup.py
develop`` path, which works without wheel.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    python_requires=">=3.11",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
)
