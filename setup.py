"""Legacy setup shim: metadata lives in pyproject.toml's [project] table
(setuptools >= 61 reads it). Exists so `pip install -e .` can use the
legacy develop path in this offline container (no `wheel` package)."""
from setuptools import setup

setup()
