"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP 517/660
editable installs (which need ``bdist_wheel``) fail. With this file and
the pip defaults in /root/.config/pip/pip.conf (no-build-isolation,
no-use-pep517), ``pip install -e .`` takes the classic
``setup.py develop`` path, which needs only setuptools.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
