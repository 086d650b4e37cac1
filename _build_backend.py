"""Minimal self-contained PEP 517 build backend.

This offline container has no ``wheel``/``hatchling``/``flit`` available,
so the standard setuptools editable install fails. This backend builds
the (editable) wheel with only the standard library: the editable wheel
is a ``.pth`` file pointing at ``src/``, the regular wheel packages
``src/repro``. Declared in ``pyproject.toml`` via ``backend-path``.
"""
import base64
import hashlib
import os
import zipfile

NAME = "repro"
VERSION = "0.1.0"
_ROOT = os.path.dirname(os.path.abspath(__file__))


def _hash(data: bytes) -> str:
    digest = hashlib.sha256(data).digest()
    return "sha256=" + base64.urlsafe_b64encode(digest).rstrip(b"=").decode()


def _write_wheel(wheel_directory: str, files: dict) -> str:
    dist = f"{NAME}-{VERSION}.dist-info"
    files[f"{dist}/METADATA"] = (
        f"Metadata-Version: 2.1\nName: {NAME}\nVersion: {VERSION}\n"
    ).encode()
    files[f"{dist}/WHEEL"] = (
        "Wheel-Version: 1.0\nGenerator: repro-local-backend\n"
        "Root-Is-Purelib: true\nTag: py3-none-any\n"
    ).encode()
    record = "".join(
        f"{arc},{_hash(data)},{len(data)}\n" for arc, data in sorted(files.items())
    ) + f"{dist}/RECORD,,\n"
    fname = f"{NAME}-{VERSION}-py3-none-any.whl"
    path = os.path.join(wheel_directory, fname)
    with zipfile.ZipFile(path, "w", zipfile.ZIP_DEFLATED) as zf:
        for arc, data in sorted(files.items()):
            zf.writestr(arc, data)
        zf.writestr(f"{dist}/RECORD", record)
    return fname


def build_editable(wheel_directory, config_settings=None, metadata_directory=None):
    src = os.path.join(_ROOT, "src")
    return _write_wheel(wheel_directory, {f"_{NAME}_editable.pth": (src + "\n").encode()})


def build_wheel(wheel_directory, config_settings=None, metadata_directory=None):
    files = {}
    pkg_root = os.path.join(_ROOT, "src")
    for dirpath, _, filenames in os.walk(os.path.join(pkg_root, NAME)):
        for fn in filenames:
            if fn.endswith((".pyc", ".pyo")):
                continue
            full = os.path.join(dirpath, fn)
            arc = os.path.relpath(full, pkg_root).replace(os.sep, "/")
            with open(full, "rb") as fh:
                files[arc] = fh.read()
    return _write_wheel(wheel_directory, files)


def build_sdist(sdist_directory, config_settings=None):
    raise NotImplementedError("sdist not needed for this reproduction")
