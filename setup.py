"""Legacy setup.py so `pip install -e .` works offline.

The container has setuptools but not `wheel`, so the PEP 660 editable path
(which shells out to bdist_wheel) fails. With no [build-system] table in
pyproject.toml, pip falls back to `setup.py develop`, which needs only
setuptools. Project metadata lives in pyproject.toml's [project] table and
is mirrored here.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    python_requires=">=3.11",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
)
