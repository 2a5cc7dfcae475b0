"""LLAP I/O elevator (§5.1): off-loaded reads with pushdown + chunk cache.

The elevator accepts projections, sargable predicates, and Bloom filters
from the scan operator, consults the (cached) row-group metadata to decide
which row groups must be read, then assembles the selected chunks — from
cache when possible, repopulating on miss — into a pandas batch ready for
vectorized processing. Metadata is evaluated *before* data loads, so chunks
that a predicate excludes are never pulled in.

Pushdown semantics:

* min/max range checks skip whole row groups (ORC-index equivalent);
* per-row-group Bloom filters (for configured columns) skip groups for
  equality/IN predicates;
* runtime semijoin Blooms (§4.6) additionally filter *rows* after load —
  they come from the dimension side, so their values cannot be compared to
  a row group without reading it.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from pathlib import Path

import pandas as pd

from repro.bloom import BloomFilter
from repro.core.expr import BinOp, Col, Expr, InList, Lit
from repro.llap.cache import ChunkKey, LlapCache
from repro.storage.layout import RowGroupMeta

__all__ = ["IOElevator", "ElevatorStats"]


@dataclass
class ElevatorStats:
    row_groups_total: int = 0
    row_groups_read: int = 0
    row_groups_skipped_minmax: int = 0
    row_groups_skipped_bloom: int = 0
    rows_filtered_by_runtime_bloom: int = 0


def _normalize(v):
    """Match the JSON normalization used in the sidecar min/max values."""
    if isinstance(v, pd.Timestamp):
        return v.isoformat()
    if hasattr(v, "isoformat"):
        return v.isoformat()
    return v


def _range_overlaps(mm: tuple, pred: BinOp) -> bool:
    lo, hi = mm
    v = _normalize(pred.right.value)
    try:
        if pred.op == "=":
            return lo <= v <= hi
        if pred.op == "<":
            return lo < v
        if pred.op == "<=":
            return lo <= v
        if pred.op == ">":
            return hi > v
        if pred.op == ">=":
            return hi >= v
    except TypeError:
        return True
    return True


def _group_survives(
    g: RowGroupMeta, preds: list[Expr], stats: ElevatorStats
) -> bool:
    for p in preds:
        if isinstance(p, BinOp) and isinstance(p.left, Col) and isinstance(p.right, Lit):
            mm = g.min_max.get(p.left.name)
            if mm is not None and not _range_overlaps(mm, p):
                stats.row_groups_skipped_minmax += 1
                return False
            if p.op == "=" and p.left.name in g.blooms:
                if not g.blooms[p.left.name].might_contain(p.right.value):
                    stats.row_groups_skipped_bloom += 1
                    return False
        elif isinstance(p, InList) and isinstance(p.arg, Col):
            mm = g.min_max.get(p.arg.name)
            if mm is not None:
                try:
                    vals = [
                        v for v in map(_normalize, p.values) if mm[0] <= v <= mm[1]
                    ]
                except TypeError:
                    vals = list(p.values)
                if not vals:
                    stats.row_groups_skipped_minmax += 1
                    return False
            else:
                vals = list(p.values)
            if p.arg.name in g.blooms and not any(
                g.blooms[p.arg.name].might_contain(v) for v in p.values
            ):
                stats.row_groups_skipped_bloom += 1
                return False
            if not p.values:  # empty IN-list: nothing can match
                stats.row_groups_skipped_minmax += 1
                return False
    return True


@dataclass
class IOElevator:
    cache: LlapCache
    stats: ElevatorStats = field(default_factory=ElevatorStats)

    def read_file(
        self,
        file: str | Path,
        columns: list[str] | None = None,
        pushed_filters: list[Expr] | None = None,
        runtime_blooms: dict[str, BloomFilter] | None = None,
    ) -> pd.DataFrame | None:
        """Read one data file through metadata pushdown + the chunk cache.

        Returns the concatenated surviving row groups (projected), or None
        when every row group was skipped.
        """
        f = str(file)
        preds = list(pushed_filters or [])
        meta = self.cache.get_meta(f)
        if meta is None:
            # no sidecar: fall back to a plain full read
            pdf = pd.read_parquet(f, columns=columns)
            return self._apply_runtime_blooms(pdf, runtime_blooms)

        self.stats.row_groups_total += len(meta.row_groups)
        selected = [g for g in meta.row_groups if _group_survives(g, preds, self.stats)]
        if not selected:
            return None
        self.stats.row_groups_read += len(selected)

        if columns is None:
            columns = sorted(
                {c for g in meta.row_groups for c in g.min_max}
                | {c for g in meta.row_groups for c in g.blooms}
            )

        # figure out which chunks are missing, load the file once if any
        missing: list[tuple[RowGroupMeta, str]] = []
        have: dict[tuple[int, str], pd.Series] = {}
        for g in selected:
            for c in columns:
                key = ChunkKey(f, g.start, c)
                s = self.cache.get_chunk(key)
                if s is None:
                    missing.append((g, c))
                else:
                    have[(g.start, c)] = s
        if missing:
            full = pd.read_parquet(f, columns=columns)
            for g, c in missing:
                s = full[c].iloc[g.start : g.start + g.n_rows].reset_index(drop=True)
                self.cache.put_chunk(ChunkKey(f, g.start, c), s)
                have[(g.start, c)] = s

        frames = []
        for g in selected:
            frames.append(
                pd.DataFrame({c: have[(g.start, c)] for c in columns})
            )
        pdf = pd.concat(frames, ignore_index=True)
        return self._apply_runtime_blooms(pdf, runtime_blooms)

    def _apply_runtime_blooms(
        self, pdf: pd.DataFrame, blooms: dict[str, object] | None
    ) -> pd.DataFrame:
        """Row-level semijoin filters: either a plain :class:`BloomFilter`
        (per-row probes, what real Hive ships) or a
        :class:`~repro.core.semijoin.RuntimeFilter` exposing ``apply`` with
        a vectorized exact-membership test."""
        if not blooms or pdf is None or pdf.empty:
            return pdf
        for colname, flt in blooms.items():
            if colname not in pdf.columns:
                continue
            if hasattr(flt, "apply"):
                mask = flt.apply(pdf[colname])
            else:
                mask = pdf[colname].map(flt.might_contain)
            self.stats.rows_filtered_by_runtime_bloom += int((~mask).sum())
            pdf = pdf[mask]
        return pdf.reset_index(drop=True)
