"""Legacy setup shim.

The container ships setuptools 65 without the ``wheel`` package and has
no network, so PEP-517 editable installs (which need bdist_wheel) fail.
``pip install -e . --no-build-isolation`` falls back to this setup.py
via ``setup.py develop``, which works offline.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
