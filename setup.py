"""Legacy-path shim: lets `pip install -e .` work offline (no wheel pkg)."""
from setuptools import setup

setup()
