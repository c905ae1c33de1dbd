"""Legacy setup.py so `pip install -e .` works offline.

The container has no network and no `wheel` package, so PEP 660
editable installs (which require bdist_wheel) fail; the legacy
`setup.py develop` path needs neither.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
