"""Minimal in-tree PEP 517/660 build backend.

The container is offline: pip cannot fetch ``setuptools``/``wheel`` for an
isolated build, and the installed setuptools (65.x) lacks ``bdist_wheel``
without the ``wheel`` package. A wheel is just a zip archive with a
``.dist-info`` directory, so this backend writes one directly with the
standard library — enough for ``pip install -e .`` (editable, via a
``.pth`` pointing at ``src/``) and ``pip install .`` (regular, copying the
package tree). No third-party build dependencies at all.
"""
from __future__ import annotations

import base64
import hashlib
import os
import zipfile

NAME = "repro"
VERSION = "0.1.0"
TAG = "py3-none-any"
ROOT = os.path.dirname(os.path.abspath(__file__))

_METADATA = f"""Metadata-Version: 2.1
Name: {NAME}
Version: {VERSION}
Summary: PySpark reproduction of Qd-tree (SIGMOD 2020)
Requires-Python: >=3.11
"""

_WHEEL = f"""Wheel-Version: 1.0
Generator: {NAME}-intree-backend
Root-Is-Purelib: true
Tag: {TAG}
"""


def _record_hash(data: bytes) -> str:
    digest = hashlib.sha256(data).digest()
    return "sha256=" + base64.urlsafe_b64encode(digest).rstrip(b"=").decode()


def _write_wheel(wheel_directory: str, files: dict[str, bytes]) -> str:
    """Write a wheel containing ``files`` (+ dist-info); returns its name."""
    dist_info = f"{NAME}-{VERSION}.dist-info"
    files = dict(files)
    files[f"{dist_info}/METADATA"] = _METADATA.encode()
    files[f"{dist_info}/WHEEL"] = _WHEEL.encode()
    record_name = f"{dist_info}/RECORD"
    record_lines = [
        f"{path},{_record_hash(data)},{len(data)}" for path, data in files.items()
    ]
    record_lines.append(f"{record_name},,")
    files[record_name] = ("\n".join(record_lines) + "\n").encode()

    wheel_name = f"{NAME}-{VERSION}-{TAG}.whl"
    path = os.path.join(wheel_directory, wheel_name)
    with zipfile.ZipFile(path, "w", zipfile.ZIP_DEFLATED) as zf:
        for arcname, data in files.items():
            zf.writestr(arcname, data)
    return wheel_name


# ----------------------------------------------------------- PEP 517 hooks
def get_requires_for_build_wheel(config_settings=None):
    return []


def get_requires_for_build_editable(config_settings=None):
    return []


def get_requires_for_build_sdist(config_settings=None):
    return []


def build_wheel(wheel_directory, config_settings=None, metadata_directory=None):
    src = os.path.join(ROOT, "src")
    files: dict[str, bytes] = {}
    for dirpath, _dirnames, filenames in os.walk(os.path.join(src, NAME)):
        for fn in sorted(filenames):
            if fn.endswith((".pyc", ".pyo")):
                continue
            full = os.path.join(dirpath, fn)
            arc = os.path.relpath(full, src).replace(os.sep, "/")
            with open(full, "rb") as f:
                files[arc] = f.read()
    return _write_wheel(wheel_directory, files)


def build_editable(wheel_directory, config_settings=None, metadata_directory=None):
    pth = os.path.join(ROOT, "src") + "\n"
    return _write_wheel(wheel_directory, {f"__editable__.{NAME}.pth": pth.encode()})


def build_sdist(sdist_directory, config_settings=None):
    import tarfile

    name = f"{NAME}-{VERSION}.tar.gz"
    base = f"{NAME}-{VERSION}"
    with tarfile.open(os.path.join(sdist_directory, name), "w:gz") as tf:
        for rel in ("pyproject.toml", "_repro_build.py", "src"):
            tf.add(os.path.join(ROOT, rel), arcname=f"{base}/{rel}")
    return name
