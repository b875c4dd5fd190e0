"""Legacy setup shim.

The sandbox has no network and no ``wheel`` package, so PEP 660 editable
installs fail with ``invalid command 'bdist_wheel'``. With no
``[build-system]`` table in pyproject.toml, pip falls back to
``setup.py develop``, which works offline.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
