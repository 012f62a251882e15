"""Legacy setup shim — see the note in pyproject.toml (offline container:
no `wheel`, so `pip install -e .` must use the setup.py editable path)."""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
