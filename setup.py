"""Legacy setuptools metadata (see the note in pyproject.toml for why
this is not PEP 621 metadata: offline container without `wheel`)."""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    python_requires=">=3.11",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
)
