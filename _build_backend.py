"""Minimal in-tree PEP 517/660 build backend.

The offline container ships setuptools 65 without the ``wheel``
package, so setuptools' own editable-wheel hook fails with
``invalid command 'bdist_wheel'`` and the package index has no
replacement. This backend makes ``pip install -e .`` (and plain wheel
builds) work with zero third-party requirements: an editable install is
a wheel containing a single ``.pth`` file pointing at ``src/``.
"""
from __future__ import annotations

import base64
import hashlib
import os
import zipfile

NAME = "repro"
VERSION = "0.1.0"
_ROOT = os.path.dirname(os.path.abspath(__file__))
_DIST_INFO = f"{NAME}-{VERSION}.dist-info"
_METADATA = (
    "Metadata-Version: 2.1\n"
    f"Name: {NAME}\n"
    f"Version: {VERSION}\n"
    "Summary: PySpark reproduction of the ICDE'18 GBDA paper\n"
)
_WHEEL = (
    "Wheel-Version: 1.0\n"
    "Generator: repro-in-tree-backend\n"
    "Root-Is-Purelib: true\n"
    "Tag: py3-none-any\n"
)


def _record_line(name: str, data: bytes) -> str:
    digest = (
        base64.urlsafe_b64encode(hashlib.sha256(data).digest())
        .rstrip(b"=")
        .decode()
    )
    return f"{name},sha256={digest},{len(data)}"


def _write_wheel(wheel_directory: str, files: dict[str, bytes]) -> str:
    fname = f"{NAME}-{VERSION}-py3-none-any.whl"
    record = "\n".join(_record_line(n, d) for n, d in files.items())
    record += f"\n{_DIST_INFO}/RECORD,,\n"
    with zipfile.ZipFile(
        os.path.join(wheel_directory, fname), "w", zipfile.ZIP_DEFLATED
    ) as z:
        for n, d in files.items():
            z.writestr(n, d)
        z.writestr(f"{_DIST_INFO}/RECORD", record)
    return fname


def _meta_files() -> dict[str, bytes]:
    return {
        f"{_DIST_INFO}/METADATA": _METADATA.encode(),
        f"{_DIST_INFO}/WHEEL": _WHEEL.encode(),
    }


def build_editable(
    wheel_directory, config_settings=None, metadata_directory=None
) -> str:
    src = os.path.join(_ROOT, "src")
    files = {f"__editable__.{NAME}.pth": (src + "\n").encode()}
    files.update(_meta_files())
    return _write_wheel(wheel_directory, files)


def build_wheel(
    wheel_directory, config_settings=None, metadata_directory=None
) -> str:
    src = os.path.join(_ROOT, "src")
    files: dict[str, bytes] = {}
    for dirpath, _, names in os.walk(os.path.join(src, NAME)):
        for n in sorted(names):
            if n.endswith((".pyc", ".pyo")):
                continue
            full = os.path.join(dirpath, n)
            rel = os.path.relpath(full, src)
            with open(full, "rb") as f:
                files[rel.replace(os.sep, "/")] = f.read()
    files.update(_meta_files())
    return _write_wheel(wheel_directory, files)


def build_sdist(sdist_directory, config_settings=None) -> str:  # pragma: no cover
    raise NotImplementedError("sdist not needed for this repo")


def get_requires_for_build_wheel(config_settings=None):
    return []


def get_requires_for_build_editable(config_settings=None):
    return []
