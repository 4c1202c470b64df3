"""Legacy setup shim: enables `pip install -e .` without the `wheel`
package (offline container). Metadata lives in pyproject.toml."""
from setuptools import setup

setup()
