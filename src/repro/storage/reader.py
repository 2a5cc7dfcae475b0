"""Snapshot reader: merge-on-read over the ACID base/delta layout (§3.2).

A scan is bound to a :class:`~repro.metastore.txn.ValidWriteIdList` at
compile time. The reader:

1. picks, per partition, the newest visible ``base`` directory and every
   delta directory above it, *discarding whole directories* whose single
   WriteId is invisible (open/aborted/future) — the directory-level skip the
   paper describes;
2. applies the row-level WriteId filter for multi-write (compacted) deltas;
3. anti-joins the surviving rows against the visible delete-delta tombstones
   on the ``(writeid, fileid, rowid)`` identity triple.

All of this happens lazily as Spark DataFrame operations, so Catalyst fuses
the visibility filter into the Parquet scan and the anti-join runs wherever
the plan needs it — the "merge happens at read time" behaviour of Hive's
second-generation ACID design.
"""
from __future__ import annotations

from pathlib import Path

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.metastore import HiveMetastore, Table, ValidWriteIdList
from repro.storage.layout import (
    DELETE_COLS,
    DirKind,
    HIDDEN_COLS,
    WRITEID_COL,
    AcidDir,
    list_acid_dirs,
)

__all__ = ["AcidReader", "spark_schema", "spark_type"]


def spark_type(dtype: str) -> T.DataType:
    """Map a catalog type string onto a Spark SQL type.

    ``decimal(p,s)`` maps to double: the workloads only aggregate these and
    the DuckDB oracle compares at 1e-6, so exact decimal arithmetic is not
    load-bearing here (documented substitution).
    """
    d = dtype.lower()
    if d.startswith("decimal"):
        return T.DoubleType()
    return {
        "int": T.IntegerType(),
        "bigint": T.LongType(),
        "float": T.FloatType(),
        "double": T.DoubleType(),
        "string": T.StringType(),
        "date": T.DateType(),
        "timestamp": T.TimestampType(),
        "boolean": T.BooleanType(),
    }[d]


def spark_schema(table: Table, include_hidden: bool = False) -> T.StructType:
    fields = [T.StructField(c.name, spark_type(c.dtype)) for c in table.columns]
    if include_hidden:
        fields += [T.StructField(h, T.LongType()) for h in HIDDEN_COLS]
    return T.StructType(fields)


class AcidReader:
    def __init__(self, hms: HiveMetastore, warehouse: Path | str, spark: SparkSession):
        self.hms = hms
        self.warehouse = Path(warehouse)
        self.spark = spark

    # -- directory selection ----------------------------------------------

    def _select_dirs(
        self, part_path: Path, wids: ValidWriteIdList
    ) -> tuple[list[AcidDir], list[AcidDir]]:
        """Visible (data_dirs, delete_dirs) for one partition directory."""
        dirs = list_acid_dirs(part_path)
        bases = [
            d for d in dirs if d.kind == DirKind.BASE and d.wmax <= wids.high_watermark
        ]
        best_base = max(bases, key=lambda d: d.wmax, default=None)
        floor = best_base.wmax if best_base else 0

        def dir_visible(d: AcidDir) -> bool:
            if d.wmax <= floor:
                return False  # superseded by the chosen base
            if d.wmin > wids.high_watermark:
                return False  # entirely in the future
            if d.wmin == d.wmax and not wids.is_valid(d.wmin):
                return False  # whole-directory skip: single open/aborted write
            return True

        data = ([best_base] if best_base else []) + [
            d for d in dirs if d.kind == DirKind.DELTA and dir_visible(d)
        ]
        deletes = [d for d in dirs if d.kind == DirKind.DELETE_DELTA and dir_visible(d)]
        return data, deletes

    def visible_files(
        self,
        table_name: str,
        wids: ValidWriteIdList,
        partitions: list[str] | None = None,
    ) -> tuple[list[str], list[str]]:
        """Parquet file paths for (data, delete) sides of a snapshot scan.

        ``partitions`` restricts to the given partition keys — the hook used
        by static and dynamic partition pruning (§4.6).
        """
        table = self.hms.get_table(table_name)
        root = self.warehouse / table_name
        if table.partitioned_by:
            keys = self.hms.partitions(table_name)
            if partitions is not None:
                wanted = set(partitions)
                keys = [k for k in keys if k in wanted]
            part_paths = [root / k for k in keys]
        else:
            part_paths = [root]

        data_files: list[str] = []
        delete_files: list[str] = []
        for p in part_paths:
            data_dirs, delete_dirs = self._select_dirs(p, wids)
            for d in data_dirs:
                data_files += [str(f) for f in sorted(d.path.glob("*.parquet"))]
            for d in delete_dirs:
                delete_files += [str(f) for f in sorted(d.path.glob("*.parquet"))]
        return data_files, delete_files

    # -- scanning ----------------------------------------------------------

    def _row_filter(self, df: DataFrame, wids: ValidWriteIdList) -> DataFrame:
        """Row-level WriteId visibility (for compacted multi-write deltas)."""
        cond = F.col(WRITEID_COL) <= F.lit(wids.high_watermark)
        if wids.invalid:
            cond = cond & ~F.col(WRITEID_COL).isin(list(wids.invalid))
        return df.filter(cond)

    def scan(
        self,
        table_name: str,
        wids: ValidWriteIdList | None = None,
        partitions: list[str] | None = None,
        columns: list[str] | None = None,
        include_hidden: bool = False,
        wid_floor: int = 0,
    ) -> DataFrame:
        """Snapshot-consistent scan returning a Spark DataFrame.

        With ``wids=None`` a fresh snapshot is taken (the common
        single-statement-query path through HS2). ``wid_floor`` keeps only
        rows with ``WriteId > wid_floor`` — the "new data since the last MV
        rebuild" filter incremental maintenance injects (§4.4).
        """
        table = self.hms.get_table(table_name)
        if wids is None:
            wids = self.hms.txns.valid_write_ids(
                self.hms.txns.snapshot(), table_name
            )
        data_files, delete_files = self.visible_files(table_name, wids, partitions)

        out_cols = columns or table.column_names()
        proj = list(out_cols) + ([] if not include_hidden else list(HIDDEN_COLS))

        if not data_files:
            schema = spark_schema(table, include_hidden)
            empty = self.spark.createDataFrame([], schema)
            return empty.select(*proj)

        df = self.spark.read.parquet(*data_files)
        df = self._row_filter(df, wids)
        if wid_floor:
            df = df.filter(F.col(WRITEID_COL) > F.lit(wid_floor))

        if delete_files:
            tomb = self.spark.read.parquet(*delete_files)
            tomb = self._row_filter(tomb, wids)  # skip aborted deleters
            tomb = tomb.select(
                *[F.col(o).alias(h) for o, h in zip(DELETE_COLS, HIDDEN_COLS)]
            ).dropDuplicates()
            df = df.join(tomb, on=list(HIDDEN_COLS), how="left_anti")

        return df.select(*proj)
