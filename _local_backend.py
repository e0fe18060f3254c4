"""In-tree PEP 517 backend shim for offline builds.

This container has no network: pip's build isolation cannot download
setuptools/wheel, so ``[build-system] requires`` is empty and this shim
re-exposes the interpreter's installed setuptools to the isolated build
environment before delegating every hook to ``setuptools.build_meta``.
"""
import site
import sys

for _p in site.getsitepackages() + [site.getusersitepackages()]:
    if _p and _p not in sys.path:
        sys.path.append(_p)

from setuptools.build_meta import *  # noqa: F401,F403,E402


def get_requires_for_build_wheel(config_settings=None):  # noqa: D103
    return []  # wheel is already importable via the site-packages re-add


def get_requires_for_build_editable(config_settings=None):  # noqa: D103
    return []


def get_requires_for_build_sdist(config_settings=None):  # noqa: D103
    return []
