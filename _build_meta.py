"""Minimal in-tree PEP 517/660 build backend.

The offline container has neither network access nor the ``wheel``
package, so setuptools' normal wheel-building path is unavailable.
A wheel is just a zip with a ``.dist-info``; this backend writes one
directly with the standard library, which makes ``pip install -e .``
(and plain ``pip install .``) work verbatim offline.
"""
from __future__ import annotations

import base64
import hashlib
import os
import zipfile

NAME = "repro"
VERSION = "0.1.0"
DIST = f"{NAME}-{VERSION}"
TAG = "py3-none-any"
ROOT = os.path.dirname(os.path.abspath(__file__))

METADATA = f"""Metadata-Version: 2.1
Name: {NAME}
Version: {VERSION}
Requires-Python: >=3.11
"""

WHEEL_META = f"""Wheel-Version: 1.0
Generator: repro-in-tree-backend
Root-Is-Purelib: true
Tag: {TAG}
"""


def _hash(data: bytes) -> str:
    digest = hashlib.sha256(data).digest()
    return "sha256=" + base64.urlsafe_b64encode(digest).rstrip(b"=").decode()


def _write_wheel(path: str, files: dict[str, bytes]) -> None:
    record_name = f"{DIST}.dist-info/RECORD"
    record_lines = [
        f"{name},{_hash(data)},{len(data)}" for name, data in files.items()
    ]
    record_lines.append(f"{record_name},,")
    record = ("\n".join(record_lines) + "\n").encode()
    with zipfile.ZipFile(path, "w", zipfile.ZIP_DEFLATED) as z:
        for name, data in files.items():
            z.writestr(name, data)
        z.writestr(record_name, record)


def _dist_info_files() -> dict[str, bytes]:
    return {
        f"{DIST}.dist-info/METADATA": METADATA.encode(),
        f"{DIST}.dist-info/WHEEL": WHEEL_META.encode(),
    }


# --- PEP 517 -----------------------------------------------------------


def get_requires_for_build_wheel(config_settings=None):
    return []


def get_requires_for_build_editable(config_settings=None):
    return []


def get_requires_for_build_sdist(config_settings=None):
    return []


def prepare_metadata_for_build_wheel(metadata_directory, config_settings=None):
    info = f"{DIST}.dist-info"
    d = os.path.join(metadata_directory, info)
    os.makedirs(d, exist_ok=True)
    with open(os.path.join(d, "METADATA"), "w") as f:
        f.write(METADATA)
    with open(os.path.join(d, "WHEEL"), "w") as f:
        f.write(WHEEL_META)
    return info


prepare_metadata_for_build_editable = prepare_metadata_for_build_wheel


def build_wheel(wheel_directory, config_settings=None, metadata_directory=None):
    files = _dist_info_files()
    src = os.path.join(ROOT, "src")
    for dirpath, _dirnames, filenames in os.walk(src):
        for fn in filenames:
            if fn.endswith((".pyc", ".pyo")):
                continue
            full = os.path.join(dirpath, fn)
            arc = os.path.relpath(full, src).replace(os.sep, "/")
            with open(full, "rb") as f:
                files[arc] = f.read()
    name = f"{DIST}-{TAG}.whl"
    _write_wheel(os.path.join(wheel_directory, name), files)
    return name


def build_editable(wheel_directory, config_settings=None, metadata_directory=None):
    files = _dist_info_files()
    files[f"__editable__.{NAME}.pth"] = (os.path.join(ROOT, "src") + "\n").encode()
    name = f"{DIST}-{TAG}.whl"
    _write_wheel(os.path.join(wheel_directory, name), files)
    return name


def build_sdist(sdist_directory, config_settings=None):
    raise NotImplementedError("sdist not needed offline")
