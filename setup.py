"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP-517
editable installs (which require ``bdist_wheel``) fail. ``pip install
-e . --no-use-pep517`` uses this file and works offline.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
