"""Legacy setuptools entrypoint.

Kept as a setup.py (not [build-system]/[project] metadata) because the
offline container lacks the `wheel` package that PEP 660 editable
installs require; `pip install -e .` then uses `setup.py develop`,
which works without it.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
