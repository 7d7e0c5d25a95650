"""Package metadata and build configuration.

This container is offline: pip cannot fetch build dependencies
(PEP 517 isolation) and the ``wheel`` package is absent (PEP 660
editable installs build a wheel). There is therefore deliberately *no*
pyproject.toml — with only setup.py present, ``pip install -e .`` takes
the legacy ``setup.py develop`` path, which works fully offline.
Pytest configuration lives in pytest.ini.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    description=(
        "PySpark reproduction of Azimov & Grigorev, 'Context-free path "
        "querying by matrix multiplication' (GRADES/PODS 2018)"
    ),
    python_requires=">=3.11",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
)
