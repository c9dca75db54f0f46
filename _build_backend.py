"""Minimal in-tree PEP 517/660 build backend.

The container is offline and lacks the ``wheel`` package, so setuptools
65.5's editable-wheel path fails (``invalid command 'bdist_wheel'``). This
backend builds the two wheel flavours pip needs directly with zipfile:

- ``build_editable``: a wheel containing only ``repro.pth`` pointing at
  ``src/`` (editable install);
- ``build_wheel``: a wheel with the ``repro`` package tree copied in.
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
Summary: Reproduction of 'Towards Optimizing Storage Costs on the Cloud' (ICDE 2023)
Requires-Python: >=3.11
"""

WHEEL_META = f"""Wheel-Version: 1.0
Generator: repro-inline-backend
Root-Is-Purelib: true
Tag: {TAG}
"""


def _record_line(name: str, data: bytes) -> str:
    digest = base64.urlsafe_b64encode(hashlib.sha256(data).digest()).rstrip(b"=")
    return f"{name},sha256={digest.decode()},{len(data)}"


def _write_wheel(path: str, files: dict[str, bytes]) -> None:
    info = f"{DIST}.dist-info"
    files = dict(files)
    files[f"{info}/METADATA"] = METADATA.encode()
    files[f"{info}/WHEEL"] = WHEEL_META.encode()
    record = [_record_line(n, d) for n, d in files.items()]
    record.append(f"{info}/RECORD,,")
    files[f"{info}/RECORD"] = ("\n".join(record) + "\n").encode()
    with zipfile.ZipFile(path, "w", zipfile.ZIP_DEFLATED) as z:
        for n, d in files.items():
            z.writestr(n, d)


def build_editable(wheel_directory, config_settings=None, metadata_directory=None):
    fname = f"{DIST}-{TAG}.whl"
    src = os.path.join(ROOT, "src")
    _write_wheel(
        os.path.join(wheel_directory, fname),
        {f"{NAME}.pth": (src + "\n").encode()},
    )
    return fname


def build_wheel(wheel_directory, config_settings=None, metadata_directory=None):
    fname = f"{DIST}-{TAG}.whl"
    files: dict[str, bytes] = {}
    pkg_root = os.path.join(ROOT, "src", NAME)
    for dirpath, _, names in os.walk(pkg_root):
        for n in names:
            if n.endswith(".pyc"):
                continue
            full = os.path.join(dirpath, n)
            rel = os.path.relpath(full, os.path.join(ROOT, "src"))
            with open(full, "rb") as f:
                files[rel.replace(os.sep, "/")] = f.read()
    _write_wheel(os.path.join(wheel_directory, fname), files)
    return fname


def get_requires_for_build_wheel(config_settings=None):
    return []


def get_requires_for_build_editable(config_settings=None):
    return []
