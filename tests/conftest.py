"""Shared fixtures for unit/integration tests.

``acid`` builds a fresh metastore + warehouse in ``tmp_path`` with a small
partitioned test table, wired to the session SparkSession.
"""
from dataclasses import dataclass
from pathlib import Path

import pandas as pd
import pytest

from repro.metastore import Column, HiveMetastore, Table
from repro.storage import AcidReader, AcidWriter, Compactor


@dataclass
class AcidEnv:
    hms: HiveMetastore
    warehouse: Path
    writer: AcidWriter
    reader: AcidReader
    compactor: Compactor

    def begin(self) -> int:
        return self.hms.txns.open_txn()

    def run_insert(self, table: str, pdf: pd.DataFrame) -> int:
        """Single-statement INSERT txn (the normal HS2 path)."""
        t = self.begin()
        wid = self.writer.insert(t, table, pdf)
        self.hms.txns.commit(t)
        return wid


def make_acid_env(spark, root: Path, row_group_rows: int = 10_000) -> AcidEnv:
    hms = HiveMetastore()
    warehouse = root / "warehouse"
    warehouse.mkdir(parents=True, exist_ok=True)
    return AcidEnv(
        hms=hms,
        warehouse=warehouse,
        writer=AcidWriter(hms, warehouse, row_group_rows=row_group_rows),
        reader=AcidReader(hms, warehouse, spark),
        compactor=Compactor(hms, warehouse, row_group_rows=row_group_rows),
    )


@pytest.fixture
def acid(spark, tmp_path) -> AcidEnv:
    env = make_acid_env(spark, tmp_path)
    env.hms.create_table(
        Table(
            name="t",
            columns=[Column("k", "bigint"), Column("v", "double"), Column("p", "bigint")],
            partitioned_by=["p"],
            properties={"bloom.filter.columns": "k"},
        )
    )
    env.hms.create_table(
        Table(
            name="u",
            columns=[Column("k", "bigint"), Column("v", "double")],
        )
    )
    return env


def rows(k, v, p=None) -> pd.DataFrame:
    d = {"k": k, "v": v}
    if p is not None:
        d["p"] = p
    return pd.DataFrame(d)
