"""Legacy setup shim.

This container has no network and no `wheel` distribution, so pip's PEP 660
editable path (which shells out to bdist_wheel) cannot run. `setup.py` lets
`pip install -e . --no-use-pep517 --no-build-isolation` take the legacy
`develop` path, which needs only setuptools. Configuration lives in
pyproject.toml; this file just mirrors the package layout.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
