"""Thin setup.py so `pip install -e .` works in this offline container.

The container has no network and no `wheel` package, so pip's PEP-660
editable build (which shells out to bdist_wheel) fails. The legacy
`setup.py develop` editable path needs only setuptools. All real metadata
lives in pyproject.toml.
"""
from setuptools import setup

setup()
