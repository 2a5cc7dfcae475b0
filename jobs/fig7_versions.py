"""Reproduce Figure 7 (§7.1) as a table: Hive v1.2 vs v3.1 per query.

    spark-submit jobs/fig7_versions.py [SF] [RUNS]
"""
import sys
import tempfile

from _common import get_spark

from repro.experiments import fig7_versions, format_rows


def main() -> None:
    sf = float(sys.argv[1]) if len(sys.argv) > 1 else 0.05
    runs = int(sys.argv[2]) if len(sys.argv) > 2 else 2
    spark = get_spark("fig7_versions")
    with tempfile.TemporaryDirectory() as d:
        print(format_rows(fig7_versions(spark, d, sf=sf, runs=runs)))
    spark.stop()


if __name__ == "__main__":
    main()
