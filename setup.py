"""Legacy setup shim so `pip install -e .` works offline (no `wheel`
package in the environment — see the note in pyproject.toml)."""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
