"""Legacy setup shim.

The container has no network and no ``wheel`` package, so PEP-517 editable
installs (which shell out to ``bdist_wheel``) fail. ``pip install -e .``
falls back to this via ``setup.py develop``; run
``pip install -e . --no-use-pep517 --no-build-isolation`` explicitly if pip
picks the PEP-517 path.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
