"""Reproduce Figure 8 (§7.3) as a table: SSB over the MV, native vs Druid.

    spark-submit jobs/fig8_druid.py [SF] [RUNS]
"""
import sys
import tempfile

from _common import get_spark

from repro.experiments import fig8_druid, format_rows


def main() -> None:
    sf = float(sys.argv[1]) if len(sys.argv) > 1 else 0.05
    runs = int(sys.argv[2]) if len(sys.argv) > 2 else 2
    spark = get_spark("fig8_druid")
    with tempfile.TemporaryDirectory() as d:
        print(format_rows(fig8_druid(spark, d, sf=sf, runs=runs)))
    spark.stop()


if __name__ == "__main__":
    main()
