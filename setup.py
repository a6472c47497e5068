"""Legacy setup.py.

The reproduction container has no network and no `wheel` package, so
PEP 517/660 builds (which shell out to bdist_wheel) fail. Keeping a
plain setup.py and no [build-system] table in pyproject.toml lets
``pip install -e .`` fall back to ``setup.py develop``, which works
offline.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
