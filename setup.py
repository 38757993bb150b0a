"""Legacy setup shim.

The container is offline and has setuptools 65.5 without the ``wheel``
package, so PEP 660 editable installs (which require bdist_wheel) fail.
``pip install -e .`` is routed through the legacy ``setup.py develop``
path instead, which needs this file.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
    python_requires=">=3.11",
)
