"""Legacy setup shim.

The container has no network access and no ``wheel`` package, so pip's
PEP 517 editable build (which shells out to ``bdist_wheel``) cannot run.
With this ``setup.py`` and no ``[build-system]`` table in pyproject.toml,
``pip install -e . --no-use-pep517`` takes the classic ``setup.py develop``
path, which works offline with the stock setuptools.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
