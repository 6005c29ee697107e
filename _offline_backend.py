"""Minimal in-tree PEP 517/660 build backend for offline environments.

The container has no network and ships setuptools 65 without the
``wheel`` package, so the stock ``setuptools.build_meta`` backend cannot
build (editable) wheels. This backend hand-assembles the trivial wheels
this project needs:

* ``build_editable`` — a wheel containing only a ``.pth`` file pointing
  at ``src/`` (plus dist-info), which is exactly what an editable
  install is;
* ``build_wheel`` — a wheel embedding the ``repro`` package tree.

Both are spec-compliant zips with METADATA/WHEEL/RECORD, so a stock pip
installs them normally.
"""
from __future__ import annotations

import base64
import hashlib
import os
import zipfile

_NAME = "repro"
_VERSION = "0.1.0"
_TAG = "py3-none-any"
_ROOT = os.path.dirname(os.path.abspath(__file__))


def _record_hash(data: bytes) -> str:
    digest = hashlib.sha256(data).digest()
    return "sha256=" + base64.urlsafe_b64encode(digest).rstrip(b"=").decode()


def _dist_info(editable: bool) -> dict[str, bytes]:
    di = f"{_NAME}-{_VERSION}.dist-info"
    metadata = (
        "Metadata-Version: 2.1\n"
        f"Name: {_NAME}\n"
        f"Version: {_VERSION}\n"
        "Requires-Python: >=3.11\n"
    ).encode()
    wheel_meta = (
        "Wheel-Version: 1.0\n"
        "Generator: _offline_backend\n"
        "Root-Is-Purelib: true\n"
        f"Tag: {_TAG}\n"
    ).encode()
    return {f"{di}/METADATA": metadata, f"{di}/WHEEL": wheel_meta}


def _write_wheel(wheel_directory: str, files: dict[str, bytes]) -> str:
    name = f"{_NAME}-{_VERSION}-{_TAG}.whl"
    path = os.path.join(wheel_directory, name)
    record_name = f"{_NAME}-{_VERSION}.dist-info/RECORD"
    record_lines = [
        f"{fn},{_record_hash(data)},{len(data)}" for fn, data in files.items()
    ]
    record_lines.append(f"{record_name},,")
    record = ("\n".join(record_lines) + "\n").encode()
    with zipfile.ZipFile(path, "w", zipfile.ZIP_DEFLATED) as zf:
        for fn, data in files.items():
            zf.writestr(fn, data)
        zf.writestr(record_name, record)
    return name


# -- PEP 517 / 660 hooks -------------------------------------------------------


def get_requires_for_build_wheel(config_settings=None):
    return []


def get_requires_for_build_editable(config_settings=None):
    return []


def get_requires_for_build_sdist(config_settings=None):
    return []


def build_editable(wheel_directory, config_settings=None, metadata_directory=None):
    files = {f"_{_NAME}_editable.pth": (os.path.join(_ROOT, "src") + "\n").encode()}
    files.update(_dist_info(editable=True))
    return _write_wheel(wheel_directory, files)


def build_wheel(wheel_directory, config_settings=None, metadata_directory=None):
    files: dict[str, bytes] = {}
    src = os.path.join(_ROOT, "src")
    for dirpath, _dirnames, filenames in os.walk(src):
        for fn in sorted(filenames):
            if fn.endswith((".pyc", ".tmp")):
                continue
            full = os.path.join(dirpath, fn)
            rel = os.path.relpath(full, src).replace(os.sep, "/")
            with open(full, "rb") as f:
                files[rel] = f.read()
    files.update(_dist_info(editable=False))
    return _write_wheel(wheel_directory, files)


def build_sdist(sdist_directory, config_settings=None):
    raise NotImplementedError("sdist not supported by the offline backend")
