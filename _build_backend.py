"""Minimal PEP 517/660 build backend (stdlib only).

The container is offline and has neither the ``wheel`` package nor a
setuptools new enough to build editable wheels without it, so
``pip install -e .`` via the setuptools backend fails.  This backend
builds the two wheel flavours pip needs — a regular wheel embedding
``src/repro`` and an editable wheel containing a ``.pth`` pointer to
``src/`` — with nothing beyond the standard library.
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

METADATA = f"""Metadata-Version: 2.1
Name: {NAME}
Version: {VERSION}
Requires-Python: >=3.11
"""

WHEEL_META = """Wheel-Version: 1.0
Generator: repro-inline-backend
Root-Is-Purelib: true
Tag: py3-none-any
"""


def _record_line(path: str, data: bytes) -> str:
    digest = base64.urlsafe_b64encode(hashlib.sha256(data).digest()).rstrip(b"=")
    return f"{path},sha256={digest.decode()},{len(data)}"


def _write_wheel(wheel_directory: str, files: dict[str, bytes]) -> str:
    files = dict(files)
    files[f"{DIST}.dist-info/METADATA"] = METADATA.encode()
    files[f"{DIST}.dist-info/WHEEL"] = WHEEL_META.encode()
    record_path = f"{DIST}.dist-info/RECORD"
    record = "\n".join(
        [_record_line(p, data) for p, data in files.items()] + [f"{record_path},,", ""]
    )
    fname = f"{DIST}-{TAG}.whl"
    out = os.path.join(wheel_directory, fname)
    with zipfile.ZipFile(out, "w", zipfile.ZIP_DEFLATED) as zf:
        for path, data in files.items():
            zf.writestr(path, data)
        zf.writestr(record_path, record)
    return fname


def build_editable(wheel_directory, config_settings=None, metadata_directory=None):
    src = os.path.abspath(os.path.join(os.path.dirname(__file__), "src"))
    return _write_wheel(wheel_directory, {f"__editable__.{NAME}.pth": (src + "\n").encode()})


def build_wheel(wheel_directory, config_settings=None, metadata_directory=None):
    root = os.path.join(os.path.dirname(__file__), "src")
    files: dict[str, bytes] = {}
    for dirpath, _dirnames, filenames in os.walk(os.path.join(root, NAME)):
        for f in sorted(filenames):
            if f.endswith((".pyc", ".pyo")):
                continue
            full = os.path.join(dirpath, f)
            rel = os.path.relpath(full, root)
            with open(full, "rb") as fh:
                files[rel.replace(os.sep, "/")] = fh.read()
    return _write_wheel(wheel_directory, files)


def build_sdist(sdist_directory, config_settings=None):  # pragma: no cover
    raise NotImplementedError("sdist not needed offline")
