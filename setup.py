"""Legacy setuptools entrypoint.

The container is offline and has no ``wheel`` package, so PEP 517/660
editable builds (which require ``bdist_wheel``) cannot run. Keeping the
package metadata here — and no ``[build-system]``/``[project]`` tables in
pyproject.toml — makes ``pip install -e .`` take the classic
``setup.py develop`` path, which works with the preinstalled setuptools.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    python_requires=">=3.11",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
)
