"""Legacy setup script.

The sandbox has no network and no ``wheel`` package, so PEP 517 editable
builds (which pip would use when ``[build-system]`` is declared) fail at the
``bdist_wheel`` step. A plain ``setup.py`` lets ``pip install -e .`` take
the legacy ``develop`` route, which works offline.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
