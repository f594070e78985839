"""Legacy setup shim.

The container has setuptools 65 without the ``wheel`` package and no
network, so PEP 660 editable installs (which need bdist_wheel) fail.
With no ``[build-system]`` table in pyproject.toml, pip falls back to
``setup.py develop`` for ``pip install -e .``, which works offline.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
