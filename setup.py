"""Legacy setup script so `pip install -e .` works in this offline
container (no `wheel` package -> PEP 660 editable builds fail; the legacy
`setup.py develop` path needs only setuptools)."""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
