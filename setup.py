"""Classic setup.py packaging.

The container's setuptools (65.x) lacks the `wheel` package, so PEP 517
editable installs fail with "invalid command 'bdist_wheel'"; the legacy
`setup.py develop` path used by `pip install -e .` works offline.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    description="Reproduction of 'Learning Individual Models for Imputation' (ICDE 2019)",
    python_requires=">=3.11",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
)
