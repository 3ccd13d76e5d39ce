"""Shim for legacy editable installs (offline container: no wheel/PEP 660)."""
from setuptools import setup

setup()
