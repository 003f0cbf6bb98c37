"""Legacy-path shim so ``pip install -e .`` works offline.

The sandbox has no network for pip's isolated build env and no
``wheel`` package, so PEP 517 editable installs fail. With this shim
(and pip defaults selecting the legacy path), setuptools installs the
package via ``setup.py develop`` using the PEP 621 metadata in
``pyproject.toml``.
"""
from setuptools import setup

setup()
