"""Classic setuptools entrypoint.

The container is offline: pip cannot fetch the ``wheel`` package that
PEP 660 editable builds require, so packaging deliberately uses the
legacy ``setup.py develop`` editable path (metadata in ``setup.cfg``).
"""
from setuptools import setup

setup()
