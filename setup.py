"""Legacy setuptools entrypoint.

The container is offline and ships setuptools 65.5 without the ``wheel``
package, so pip's PEP 517/660 editable path (which shells out to
``bdist_wheel``) cannot run. Keeping the build metadata here and leaving
``pyproject.toml`` without a ``[build-system]`` table makes
``pip install -e .`` take the legacy ``setup.py develop`` path, which works
offline.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    python_requires=">=3.11",
    package_dir={"": "src"},
    packages=find_packages("src"),
)
