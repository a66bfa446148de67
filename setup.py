"""Legacy setuptools shim: enables `pip install -e .` without network access
(the PEP 517 editable path would need to download `wheel`)."""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
