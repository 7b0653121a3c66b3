"""Legacy-path installer shim.

The container is offline and lacks the ``wheel`` package, so PEP 660
editable installs cannot build; with no [build-system] in pyproject.toml,
``pip install -e .`` uses ``setup.py develop`` which works with setuptools
alone. Metadata mirrors pyproject's [project] table.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
