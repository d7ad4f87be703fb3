"""Legacy setup shim.

The container has no network and no `wheel` package, so PEP-517 editable
installs fail (`bdist_wheel` unavailable). `pip install -e . --no-build-isolation
--no-use-pep517` takes the setup.py develop path, which works offline.
Metadata lives in pyproject.toml; this file only mirrors the package layout.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
