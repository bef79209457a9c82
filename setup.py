"""Legacy-install shim.

The container is offline and ships setuptools without ``wheel``, so the
PEP 517 editable path (which needs ``bdist_wheel``) fails.  This shim
enables ``pip install -e . --no-use-pep517``; plain ``pip install -e .``
also resolves through it once pip falls back.  All metadata lives in
``pyproject.toml``.
"""
from setuptools import setup

setup()
