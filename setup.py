"""Setuptools entrypoint.

Kept alongside pyproject.toml so ``pip install -e .`` also works in
offline containers whose setuptools predates bundled bdist_wheel
(PEP 660 editable installs need the ``wheel`` package there); pip falls
back to the legacy ``setup.py develop`` path via
``pip install -e . --no-use-pep517`` when required.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages("src"),
    python_requires=">=3.11",
)
