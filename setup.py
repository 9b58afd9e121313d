"""Legacy setup shim: the container has no `wheel` package and no
network, so PEP-517 editable installs (which build a wheel) fail.
`pip install -e . --no-build-isolation --no-use-pep517` uses this file
via the classic `setup.py develop` path, which needs no wheel."""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
