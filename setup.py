"""Setuptools shim for offline installs.

Kept alongside pyproject.toml so ``python setup.py develop`` remains a
fallback in environments where pip's PEP-660 editable route cannot run
(this container originally lacked the ``wheel`` package; see the note at
the top of pyproject.toml). All metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
