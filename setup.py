"""Legacy setuptools entrypoint.

The container is offline and lacks the ``wheel`` package, so PEP 517/660
editable installs fail (`invalid command 'bdist_wheel'`). With no
``[build-system]`` table in pyproject.toml, ``pip install -e .`` uses the
legacy ``setup.py develop`` path through this file, which needs only the
bundled setuptools. Metadata still comes from pyproject's ``[project]`` table.
"""
from setuptools import setup

setup()
