"""Legacy setup.py so ``pip install -e .`` works offline.

The container's package mirror has no ``wheel`` distribution, so PEP-660
editable installs (which require setuptools' bdist_wheel) fail. With a
setup.py and no [build-system] table, pip falls back to ``setup.py develop``,
which needs only setuptools.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
