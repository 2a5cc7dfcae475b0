"""Physical layout of ACID tables on the (local) file system (§3.1–3.2).

Mirrors Hive's directory scheme::

    warehouse/<table>/[<col>=<val>/...]/base_<w>/bucket_<fileid>.parquet
                                        delta_<wmin>_<wmax>/bucket_<fileid>.parquet
                                        delete_delta_<wmin>_<wmax>/bucket_<fileid>.parquet

plus a sidecar ``bucket_<fileid>.meta.json`` per data file holding row-group
metadata (min/max per column, optional Bloom filters) — the Parquet-world
equivalent of ORC's row-group indexes, which the LLAP I/O elevator and index
semijoin push predicates into.

Hidden columns stored in every ACID data file: ``__writeid``, ``__fileid``,
``__rowid`` — their combination uniquely identifies a record (§3.2). Delete
deltas store tombstones referencing that triple. Partition column values are
additionally materialized *inside* the files (Hive keeps them only in the
directory name; storing them inline lets one ``spark.read.parquet`` over a
mixed file list retain them without relying on Spark partition discovery over
Hive's non-``k=v`` base/delta directory levels).
"""
from __future__ import annotations

import json
import re
from dataclasses import dataclass
from pathlib import Path

import pandas as pd

from repro.bloom import BloomFilter

__all__ = [
    "WRITEID_COL",
    "FILEID_COL",
    "ROWID_COL",
    "HIDDEN_COLS",
    "DELETE_COLS",
    "DirKind",
    "AcidDir",
    "partition_key",
    "partition_values_from_key",
    "base_dir",
    "delta_dir",
    "delete_delta_dir",
    "bucket_file",
    "parse_acid_dir",
    "list_acid_dirs",
    "RowGroupMeta",
    "FileMeta",
    "write_file_meta",
    "read_file_meta",
]

WRITEID_COL = "__writeid"
FILEID_COL = "__fileid"
ROWID_COL = "__rowid"
HIDDEN_COLS = (WRITEID_COL, FILEID_COL, ROWID_COL)
# tombstone columns in delete_delta files: the target triple
DELETE_COLS = ("__orig_writeid", "__orig_fileid", "__orig_rowid")

_DIR_RE = re.compile(r"^(base)_(\d+)$|^(delta|delete_delta)_(\d+)_(\d+)$")


class DirKind:
    BASE = "base"
    DELTA = "delta"
    DELETE_DELTA = "delete_delta"


@dataclass(frozen=True)
class AcidDir:
    """A parsed base/delta directory with its WriteId range."""

    path: Path
    kind: str
    wmin: int
    wmax: int  # == wmin for single-write deltas; base covers (0, wmax]


def partition_key(part_cols: list[str], values: tuple) -> str:
    """``['p','q'], (1,'x')`` → ``'p=1/q=x'`` (empty string if unpartitioned)."""
    return "/".join(f"{c}={v}" for c, v in zip(part_cols, values))


def partition_values_from_key(key: str) -> dict[str, str]:
    if not key:
        return {}
    return dict(seg.split("=", 1) for seg in key.split("/"))


def base_dir(w: int) -> str:
    return f"base_{w:07d}"


def delta_dir(wmin: int, wmax: int) -> str:
    return f"delta_{wmin:07d}_{wmax:07d}"


def delete_delta_dir(wmin: int, wmax: int) -> str:
    return f"delete_delta_{wmin:07d}_{wmax:07d}"


def bucket_file(fileid: int) -> str:
    return f"bucket_{fileid:05d}.parquet"


def parse_acid_dir(name: str) -> tuple[str, int, int] | None:
    """``'delta_0000002_0000004'`` → ``('delta', 2, 4)``; None if not ACID."""
    m = _DIR_RE.match(name)
    if not m:
        return None
    if m.group(1):  # base_N
        return (DirKind.BASE, 0, int(m.group(2)))
    return (m.group(3), int(m.group(4)), int(m.group(5)))


def list_acid_dirs(partition_path: Path) -> list[AcidDir]:
    """All base/delta dirs directly under a partition (or table) directory."""
    out = []
    if not partition_path.exists():
        return out
    for child in sorted(partition_path.iterdir()):
        if not child.is_dir():
            continue
        parsed = parse_acid_dir(child.name)
        if parsed:
            kind, wmin, wmax = parsed
            out.append(AcidDir(child, kind, wmin, wmax))
    return out


# -- row-group sidecar metadata (ORC-index equivalent) ---------------------


@dataclass
class RowGroupMeta:
    start: int
    n_rows: int
    min_max: dict[str, tuple]  # col -> (min, max), JSON-normalized
    blooms: dict[str, BloomFilter]


@dataclass
class FileMeta:
    n_rows: int
    row_groups: list[RowGroupMeta]


def _json_val(v):
    """Normalize a pandas scalar for JSON min/max storage.

    Timestamps/dates become ISO strings; the elevator normalizes query
    literals the same way so comparisons stay consistent.
    """
    if isinstance(v, pd.Timestamp):
        return v.isoformat()
    if hasattr(v, "item"):
        return v.item()
    return v


def compute_file_meta(
    pdf: pd.DataFrame,
    row_group_rows: int = 10_000,
    bloom_columns: tuple[str, ...] = (),
) -> FileMeta:
    """Per-row-group min/max for every column + Blooms for configured ones.

    Mirrors ORC: indexes exist for all columns; Bloom filters only for the
    columns named in table properties (``orc.bloom.filter.columns``-style).
    """
    groups: list[RowGroupMeta] = []
    cols = [c for c in pdf.columns]
    for start in range(0, max(1, len(pdf)), row_group_rows):
        chunk = pdf.iloc[start : start + row_group_rows]
        if chunk.empty and start > 0:
            break
        mm: dict[str, tuple] = {}
        blooms: dict[str, BloomFilter] = {}
        for c in cols:
            s = chunk[c].dropna()
            if len(s):
                mm[c] = (_json_val(s.min()), _json_val(s.max()))
            if c in bloom_columns:
                blooms[c] = BloomFilter.of(s.unique().tolist())
        groups.append(RowGroupMeta(start, len(chunk), mm, blooms))
    return FileMeta(len(pdf), groups)


def write_file_meta(meta: FileMeta, data_file: Path) -> Path:
    """Persist sidecar metadata next to ``data_file`` (``*.meta.json``)."""
    payload = {
        "n_rows": meta.n_rows,
        "row_groups": [
            {
                "start": g.start,
                "n_rows": g.n_rows,
                "min_max": {c: list(v) for c, v in g.min_max.items()},
                "blooms": {c: b.to_b64() for c, b in g.blooms.items()},
            }
            for g in meta.row_groups
        ],
    }
    out = data_file.with_suffix(".meta.json")
    out.write_text(json.dumps(payload))
    return out


def read_file_meta(data_file: Path) -> FileMeta | None:
    side = data_file.with_suffix(".meta.json")
    if not side.exists():
        return None
    raw = json.loads(side.read_text())
    return FileMeta(
        n_rows=raw["n_rows"],
        row_groups=[
            RowGroupMeta(
                start=g["start"],
                n_rows=g["n_rows"],
                min_max={c: tuple(v) for c, v in g["min_max"].items()},
                blooms={c: BloomFilter.from_b64(b) for c, b in g["blooms"].items()},
            )
            for g in raw["row_groups"]
        ],
    )
