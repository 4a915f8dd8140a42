"""Setuptools entry point.

The container has no network and no `wheel` package, so PEP 660 editable
installs (which need `bdist_wheel`) fail. Keeping a classic setup.py lets
`pip install -e .` fall back to `setup.py develop`, which works offline.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
