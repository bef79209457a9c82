"""Shared sizing constants for the test-suite stream fixtures.

Kept outside ``conftest.py`` so test modules can import them (the repo
root also has a ``conftest.py``, which shadows ``tests/conftest`` on the
import path).
"""
SMALL = dict(n_elements=800, z=12, duration=480, seed=11)
SMALL_T, SMALL_L = 240, 15
TINY = dict(n_elements=120, z=6, duration=120, seed=23)
TINY_T, TINY_L = 60, 10
