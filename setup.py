"""Legacy-editable-install shim.

The offline container ships setuptools 65 without ``wheel``, so PEP 660
editable installs (`pip install -e .` via pyproject only) fail with
"invalid command 'bdist_wheel'". This shim enables the legacy path:

    pip install -e . --no-build-isolation --no-use-pep517
"""
from setuptools import setup

setup()
