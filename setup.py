"""Legacy setuptools entrypoint.

Kept because the offline container lacks the ``wheel`` package, which the
PEP 660 editable-install path requires; ``pip install -e .`` then uses
``setup.py develop``, which works without it. Metadata mirrors
pyproject.toml.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
