"""Legacy setup shim.

The container ships setuptools 65.5 without the ``wheel`` package and
has no network, so PEP-660 editable installs fail (dist_info needs
bdist_wheel). ``pip install -e .`` is routed through the legacy
``setup.py develop`` path via ``--no-use-pep517`` (see README), which
needs no wheel.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
