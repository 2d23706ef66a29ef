"""Legacy setup shim.

The container is offline and has no ``wheel`` package, so PEP 660
editable installs (which pip implements via ``bdist_wheel``) cannot
work. Keeping a ``setup.py`` and no ``[build-system]`` table in
pyproject.toml makes ``pip install -e .`` fall back to the legacy
``setup.py develop`` path, which needs only setuptools.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
