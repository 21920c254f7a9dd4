"""Legacy setup.py so ``pip install -e .`` works without the ``wheel``
package (unavailable in this offline container; PEP 660 editable builds
require bdist_wheel)."""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    python_requires=">=3.11",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
)
