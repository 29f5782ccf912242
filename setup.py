"""Legacy setuptools entrypoint.

This container is offline and has setuptools 65 without the ``wheel``
package, so PEP 660 editable installs (``bdist_wheel``) fail. Keeping a
``setup.py`` and no ``[build-system]`` table in pyproject.toml makes
``pip install -e .`` take the legacy ``setup.py develop`` path, which works
without network access.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
