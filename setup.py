"""Legacy setup shim.

The sandbox has no package index, so PEP 660 editable installs fail
(setuptools < 70 needs the ``wheel`` package for ``bdist_wheel``).
``python setup.py develop`` (or ``pip install -e . --no-build-isolation``
on newer setuptools) installs via egg-link with no extra build deps.
All project metadata lives in pyproject.toml.
"""
from setuptools import setup

setup()
