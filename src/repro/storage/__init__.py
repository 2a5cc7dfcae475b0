"""ACID storage substrate: base/delta layout, writer, snapshot reader, compactor."""
from .compactor import CompactionDecision, Compactor
from .layout import (
    DELETE_COLS,
    FILEID_COL,
    HIDDEN_COLS,
    ROWID_COL,
    WRITEID_COL,
    AcidDir,
    DirKind,
    partition_key,
    partition_values_from_key,
)
from .reader import AcidReader, spark_schema, spark_type
from .writer import AcidWriter

__all__ = [
    "CompactionDecision",
    "Compactor",
    "DELETE_COLS",
    "FILEID_COL",
    "HIDDEN_COLS",
    "ROWID_COL",
    "WRITEID_COL",
    "AcidDir",
    "DirKind",
    "partition_key",
    "partition_values_from_key",
    "AcidReader",
    "spark_schema",
    "spark_type",
    "AcidWriter",
]
