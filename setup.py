"""Legacy setup.py so ``pip install -e .`` works offline.

The container has no network and no ``wheel`` package, so PEP 660 editable
wheels cannot be built; the legacy ``setup.py develop`` path needs only
setuptools.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    description=(
        "PySpark reproduction of 'In-database connected component analysis'"
        " (Boegeholz, Brand, Todor, ICDE 2020)"
    ),
    python_requires=">=3.11",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
)
