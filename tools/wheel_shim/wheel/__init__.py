"""Minimal offline stand-in for the ``wheel`` package.

This container has no package index and setuptools' PEP 660 editable
install requires ``wheel.wheelfile.WheelFile`` and a ``bdist_wheel``
distutils command.  This shim provides exactly that slice — enough for
``pip install -e .`` of pure-Python projects — and nothing else.
Install with ``python tools/install_wheel_shim.py`` (done once in this
container).
"""
__version__ = "0.0.0+offline-shim"
