"""Legacy setup shim: enables `pip install -e .` without the `wheel`
package (the container is offline; PEP-660 editable builds need wheel)."""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
