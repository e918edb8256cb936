"""Legacy-editable-install shim.

The offline container lacks the `wheel` package, so PEP-660 editable
installs (`pip install -e .` via pyproject build-system) fail with
"invalid command 'bdist_wheel'". This shim lets pip take the legacy
``setup.py develop`` path instead. Metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
