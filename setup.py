"""Legacy setup shim for offline editable installs.

This container has no network. ``pip install -e .`` works because the
user pip config (``~/.config/pip/pip.conf``) points ``find-links`` at
``/root/pip-wheels`` where the build dependencies (setuptools, wheel)
are staged; this shim additionally keeps the legacy setup.py path
available as a fallback. All real metadata lives in pyproject.toml.
"""

from setuptools import setup

setup()
