"""Directory naming, partition keys, row-group sidecar metadata, Bloom."""
import pandas as pd
import pytest

from repro.bloom import BloomFilter
from repro.storage.layout import (
    DirKind,
    base_dir,
    bucket_file,
    compute_file_meta,
    delete_delta_dir,
    delta_dir,
    parse_acid_dir,
    partition_key,
    partition_values_from_key,
    read_file_meta,
    write_file_meta,
)


class TestNaming:
    def test_base(self):
        assert base_dir(100) == "base_0000100"
        assert parse_acid_dir("base_0000100") == (DirKind.BASE, 0, 100)

    def test_delta(self):
        assert delta_dir(101, 101) == "delta_0000101_0000101"
        assert parse_acid_dir("delta_0000101_0000105") == (DirKind.DELTA, 101, 105)

    def test_delete_delta(self):
        assert parse_acid_dir(delete_delta_dir(102, 102)) == (
            DirKind.DELETE_DELTA,
            102,
            102,
        )

    def test_non_acid_dirs_ignored(self):
        assert parse_acid_dir("tmp_xyz") is None
        assert parse_acid_dir("base_") is None
        assert parse_acid_dir("delta_1") is None

    def test_bucket_file(self):
        assert bucket_file(3) == "bucket_00003.parquet"


class TestPartitionKeys:
    def test_single(self):
        assert partition_key(["p"], (5,)) == "p=5"

    def test_multi(self):
        assert partition_key(["a", "b"], (1, "x")) == "a=1/b=x"

    def test_empty(self):
        assert partition_key([], ()) == ""

    def test_roundtrip(self):
        assert partition_values_from_key("a=1/b=x") == {"a": "1", "b": "x"}
        assert partition_values_from_key("") == {}


class TestFileMeta:
    def _pdf(self, n=25_000):
        return pd.DataFrame({"k": range(n), "v": [i * 0.5 for i in range(n)]})

    def test_row_groups_chunked(self):
        meta = compute_file_meta(self._pdf(), row_group_rows=10_000)
        assert [g.n_rows for g in meta.row_groups] == [10_000, 10_000, 5_000]
        assert meta.n_rows == 25_000

    def test_min_max_per_group(self):
        meta = compute_file_meta(self._pdf(), row_group_rows=10_000)
        assert meta.row_groups[0].min_max["k"] == (0, 9_999)
        assert meta.row_groups[2].min_max["k"] == (20_000, 24_999)

    def test_blooms_only_for_configured_columns(self):
        meta = compute_file_meta(self._pdf(100), 50, bloom_columns=("k",))
        assert "k" in meta.row_groups[0].blooms
        assert "v" not in meta.row_groups[0].blooms

    def test_bloom_membership(self):
        meta = compute_file_meta(self._pdf(100), 100, bloom_columns=("k",))
        b = meta.row_groups[0].blooms["k"]
        assert b.might_contain(42)
        assert not b.might_contain(-1)

    def test_roundtrip(self, tmp_path):
        f = tmp_path / "bucket_00000.parquet"
        pdf = self._pdf(1000)
        pdf.to_parquet(f)
        meta = compute_file_meta(pdf, 400, bloom_columns=("k",))
        write_file_meta(meta, f)
        got = read_file_meta(f)
        assert got.n_rows == 1000
        assert [g.start for g in got.row_groups] == [0, 400, 800]
        assert got.row_groups[1].min_max["k"] == (400, 799)
        assert got.row_groups[0].blooms["k"].might_contain(5)

    def test_missing_sidecar(self, tmp_path):
        assert read_file_meta(tmp_path / "nope.parquet") is None

    def test_timestamp_min_max_serializable(self, tmp_path):
        pdf = pd.DataFrame({"d": pd.to_datetime(["2018-01-02", "2018-03-04"])})
        f = tmp_path / "bucket_00000.parquet"
        pdf.to_parquet(f)
        write_file_meta(compute_file_meta(pdf), f)
        got = read_file_meta(f)
        assert got.row_groups[0].min_max["d"][0].startswith("2018-01-02")


class TestBloomFilter:
    def test_no_false_negatives(self):
        b = BloomFilter.of(range(1000))
        assert all(b.might_contain(i) for i in range(1000))

    def test_fpp_reasonable(self):
        b = BloomFilter.of(range(1000), fpp=0.01)
        fp = sum(b.might_contain(i) for i in range(10_000, 20_000))
        assert fp < 300  # 3% at target 1%

    def test_none_excluded(self):
        b = BloomFilter.of([1, None, 2])
        assert not b.might_contain(None)

    def test_serde_roundtrip(self):
        b = BloomFilter.of(["x", "y", "z"])
        c = BloomFilter.from_b64(b.to_b64())
        assert c.might_contain("x") and not c.might_contain("w")

    def test_strings_and_ints_distinct(self):
        b = BloomFilter.of([1])
        assert not b.might_contain("1")

    @pytest.mark.parametrize("n", [1, 10, 100])
    def test_capacity_sizing(self, n):
        b = BloomFilter.for_capacity(n)
        assert b.m >= 64 and b.k >= 1
