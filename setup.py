"""Legacy setup.py so `pip install -e .` works offline.

The sandbox has no network and no `wheel` package, so PEP-517 editable
installs (which need bdist_wheel) fail; the legacy develop path does not.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
