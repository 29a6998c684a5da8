"""Shim for legacy editable installs.

This container ships setuptools 65 without the ``wheel`` package and has no
network, so PEP-660 editable installs (which require ``bdist_wheel``) fail.
``pip install -e .`` falls back to ``setup.py develop`` through this shim
(via ``--no-use-pep517``, auto-selected by the absence of wheel on some pip
versions). Configuration lives in pyproject.toml.
"""
from setuptools import setup

setup()
