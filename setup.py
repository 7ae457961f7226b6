"""Legacy setup shim: the container is offline with setuptools 65 and no
``wheel``, so ``pip install -e .`` must take the non-PEP-517 path."""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
