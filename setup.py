"""Legacy setup shim.

The container is offline and has setuptools but no ``wheel`` package,
so PEP 660 editable installs (which build a wheel) fail. Keeping a
``setup.py`` and no ``[build-system]`` table in ``pyproject.toml`` lets
``pip install -e .`` take the legacy ``setup.py develop`` path, which
needs nothing beyond setuptools.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
