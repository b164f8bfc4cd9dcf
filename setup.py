"""Legacy entrypoint so editable install works without the `wheel` package.

The container has setuptools 65.5 but no `wheel` and no network, so
pip's PEP-660 editable build (`pip install -e .`) cannot build a wheel.
`python setup.py develop` (or the repro-dev.pth fallback) provides the
same editable behaviour.
"""
from setuptools import setup

setup()
