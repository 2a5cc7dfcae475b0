"""Minimal in-tree PEP 517 + PEP 660 build backend.

The sandbox has no network and no ``wheel`` package, so the stock
setuptools backend cannot build the (editable) wheel ``pip install -e .``
needs. This backend produces the wheels directly with the standard
library: the editable wheel contains a ``.pth`` file pointing at ``src/``
(exactly what setuptools' "compat" editable mode would emit), the regular
wheel packages ``src/repro`` verbatim.
"""
from __future__ import annotations

import base64
import csv
import hashlib
import io
import os
import zipfile
from pathlib import Path

NAME = "repro"
VERSION = "0.1.0"
DIST = f"{NAME}-{VERSION}"
TAG = "py3-none-any"
ROOT = Path(__file__).resolve().parent


def _metadata() -> str:
    return (
        "Metadata-Version: 2.1\n"
        f"Name: {NAME}\n"
        f"Version: {VERSION}\n"
        "Summary: PySpark reproduction of 'Apache Hive: From MapReduce to "
        "Enterprise-grade Big Data Warehousing' (SIGMOD 2019)\n"
        "Requires-Python: >=3.11\n"
    )


def _wheel_metadata() -> str:
    return (
        "Wheel-Version: 1.0\n"
        "Generator: repro-inline-backend\n"
        "Root-Is-Purelib: true\n"
        f"Tag: {TAG}\n"
    )


def _record_hash(data: bytes) -> str:
    digest = hashlib.sha256(data).digest()
    return "sha256=" + base64.urlsafe_b64encode(digest).rstrip(b"=").decode()


def _write_wheel(path: Path, files: dict[str, bytes]) -> None:
    record_name = f"{DIST}.dist-info/RECORD"
    with zipfile.ZipFile(path, "w", zipfile.ZIP_DEFLATED) as zf:
        record_rows = []
        for name, data in files.items():
            zf.writestr(name, data)
            record_rows.append([name, _record_hash(data), str(len(data))])
        record_rows.append([record_name, "", ""])
        buf = io.StringIO()
        csv.writer(buf, lineterminator="\n").writerows(record_rows)
        zf.writestr(record_name, buf.getvalue())


def _dist_info(files: dict[str, bytes]) -> None:
    files[f"{DIST}.dist-info/METADATA"] = _metadata().encode()
    files[f"{DIST}.dist-info/WHEEL"] = _wheel_metadata().encode()


# -- PEP 517 ---------------------------------------------------------------


def build_wheel(wheel_directory, config_settings=None, metadata_directory=None) -> str:
    files: dict[str, bytes] = {}
    src = ROOT / "src" / NAME
    for p in sorted(src.rglob("*")):
        if p.is_file() and "__pycache__" not in p.parts:
            files[str(p.relative_to(ROOT / "src"))] = p.read_bytes()
    _dist_info(files)
    out = Path(wheel_directory) / f"{DIST}-{TAG}.whl"
    _write_wheel(out, files)
    return out.name


def build_sdist(sdist_directory, config_settings=None) -> str:
    import tarfile

    out = Path(sdist_directory) / f"{DIST}.tar.gz"
    with tarfile.open(out, "w:gz") as tf:
        for rel in ["pyproject.toml", "_build_backend.py", "src"]:
            tf.add(ROOT / rel, arcname=f"{DIST}/{rel}")
    return out.name


# -- PEP 660 (editable) ----------------------------------------------------


def build_editable(wheel_directory, config_settings=None, metadata_directory=None) -> str:
    files: dict[str, bytes] = {
        f"__editable__.{DIST}.pth": f"{ROOT / 'src'}{os.linesep}".encode()
    }
    _dist_info(files)
    out = Path(wheel_directory) / f"{DIST}-{TAG}.whl"
    _write_wheel(out, files)
    return out.name


def get_requires_for_build_wheel(config_settings=None):
    return []


def get_requires_for_build_sdist(config_settings=None):
    return []


def get_requires_for_build_editable(config_settings=None):
    return []
