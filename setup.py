"""Setup shim: the container has no `wheel` package and no network, so
PEP 517 editable installs (which need bdist_wheel) fail.  This setup.py
lets `pip install -e .` fall back to the legacy `setup.py develop` path,
which only needs setuptools."""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
