"""Legacy setup shim: the container's package index ships no `wheel`
distribution, so PEP 660 editable installs (which require bdist_wheel)
cannot run. With ~/.pip/pip.conf setting no-build-isolation and
use-pep517=false, `pip install -e .` takes the setup.py develop path.
"""
from setuptools import setup

setup()
