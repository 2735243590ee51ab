"""Legacy setup shim: the container has setuptools 65 but no `wheel`
package and no network, so PEP-517 editable installs (which need
bdist_wheel) fail. `pip install -e .` falls back to this via
--no-use-pep517; metadata lives in pyproject.toml."""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
)
