"""Legacy setup shim (configuration lives in ``pyproject.toml``).

``pip install -e .`` works in a normal environment. This offline container
lacks both network (for the isolated build env) and the ``wheel`` package
(for any local editable build) — there, run ``python dev_install.py``
instead, which installs the equivalent ``.pth`` pointer to ``src/``.
"""
from setuptools import find_packages, setup

setup(
    name="repro",
    version="0.1.0",
    package_dir={"": "src"},
    packages=find_packages(where="src"),
)
