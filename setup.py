"""Legacy setuptools entry point.

Exists so ``pip install -e .`` works in this offline container (no
``wheel`` available for PEP-660 editable builds); metadata lives in
pyproject.toml.
"""
from setuptools import setup

setup()
