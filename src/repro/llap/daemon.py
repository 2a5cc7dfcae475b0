"""LLAP daemon (§5.1): persistent executors + cache-backed table scans.

A daemon bundles the I/O elevator, the chunk/metadata cache, and a bounded
pool of *executors* that run query fragments in parallel (the unit the
workload manager preempts/moves, §5.2). Daemons are stateless with respect
to data: everything they hold is a cache over the ACID files, so any
daemon could serve any fragment after a failure.

``scan_table`` is the LLAP fast path used by the HS2 execution context: it
resolves the snapshot's visible files exactly like the container-mode
reader, but reads them through the elevator (row-group skipping + cache)
and applies delete tombstones in pandas — small delete deltas are merged
in memory, the paper's observation about the anti-join side staying tiny.

Container-vs-LLAP modelling: a daemon is always warm. Container mode pays
``container_startup_s`` per query for YARN container allocation and reads
files cold (no caches). The startup constant is a documented calibration
knob (EXPERIMENTS.md), not a measurement of this machine.
"""
from __future__ import annotations

import time
from concurrent.futures import Future, ThreadPoolExecutor
from dataclasses import dataclass, field

import pandas as pd

from repro.bloom import BloomFilter
from repro.core.expr import Expr
from repro.llap.cache import LlapCache
from repro.llap.elevator import IOElevator
from repro.metastore import HiveMetastore, ValidWriteIdList
from repro.storage import AcidReader
from repro.storage.layout import DELETE_COLS, HIDDEN_COLS, WRITEID_COL

__all__ = ["LlapDaemon"]


@dataclass
class LlapDaemon:
    hms: HiveMetastore
    warehouse: str
    n_executors: int = 4
    cache: LlapCache = field(default_factory=LlapCache)

    def __post_init__(self) -> None:
        self.elevator = IOElevator(self.cache)
        self._pool = ThreadPoolExecutor(
            max_workers=self.n_executors, thread_name_prefix="llap-exec"
        )
        # AcidReader is reused only for visible-file resolution (no Spark)
        self._reader = AcidReader(self.hms, self.warehouse, spark=None)

    # -- query fragment execution -----------------------------------------

    def submit_fragment(self, fn, *args, **kwargs) -> Future:
        """Run a query fragment on one of the daemon's executors."""
        return self._pool.submit(fn, *args, **kwargs)

    def shutdown(self) -> None:
        self._pool.shutdown(wait=True)

    # -- the LLAP scan path -------------------------------------------------

    def scan_table(
        self,
        table: str,
        wids: ValidWriteIdList | None = None,
        partitions: list[str] | None = None,
        columns: list[str] | None = None,
        pushed_filters: list[Expr] | None = None,
        runtime_blooms: dict[str, BloomFilter] | None = None,
        wid_floor: int = 0,
    ) -> pd.DataFrame:
        """Snapshot-consistent scan through cache + elevator → pandas batch.

        ``wid_floor`` keeps only rows with ``WriteId > wid_floor`` (MV
        incremental maintenance, §4.4)."""
        if wids is None:
            wids = self.hms.txns.valid_write_ids(self.hms.txns.snapshot(), table)
        data_files, delete_files = self._reader.visible_files(table, wids, partitions)

        t = self.hms.get_table(table)
        out_cols = columns or t.column_names()
        read_cols = list(dict.fromkeys(list(out_cols) + list(HIDDEN_COLS)))

        frames = []
        futures = [
            self.submit_fragment(
                self.elevator.read_file,
                f,
                read_cols,
                pushed_filters,
                runtime_blooms,
            )
            for f in data_files
        ]
        for fut in futures:
            pdf = fut.result()
            if pdf is not None and len(pdf):
                frames.append(pdf)
        if not frames:
            return pd.DataFrame(columns=out_cols)
        data = pd.concat(frames, ignore_index=True)

        # row-level WriteId visibility (compacted multi-write deltas) —
        # vectorized: the invalid set is small, the comparison is columnar
        mask = (data[WRITEID_COL] > 0) & (data[WRITEID_COL] <= wids.high_watermark)
        if wids.invalid:
            mask &= ~data[WRITEID_COL].isin(list(wids.invalid))
        data = data[mask]
        if wid_floor:
            data = data[data[WRITEID_COL] > wid_floor]

        # apply delete tombstones in memory — delete deltas are small
        if delete_files:
            tombs = pd.concat(
                [pd.read_parquet(f) for f in delete_files], ignore_index=True
            )
            tmask = (tombs[WRITEID_COL] > 0) & (
                tombs[WRITEID_COL] <= wids.high_watermark
            )
            if wids.invalid:
                tmask &= ~tombs[WRITEID_COL].isin(list(wids.invalid))
            tombs = tombs[tmask]
            t3 = tombs[list(DELETE_COLS)].rename(
                columns=dict(zip(DELETE_COLS, HIDDEN_COLS))
            ).drop_duplicates()
            data = data.merge(t3, on=list(HIDDEN_COLS), how="left", indicator=True)
            data = data[data["_merge"] == "left_only"]
        return data[list(out_cols)].reset_index(drop=True)


def simulate_container_allocation(container_startup_s: float) -> None:
    """The YARN container allocation delay container mode pays per query."""
    if container_startup_s > 0:
        time.sleep(container_startup_s)
