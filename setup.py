"""Legacy setup shim: the container has no `wheel` package and no network,
so PEP-517 editable installs (which need bdist_wheel) fail. `pip install -e .
--no-use-pep517` takes the setup.py/egg-link path instead, which only needs
setuptools. Configuration lives in pyproject.toml; this mirrors the minimum."""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
