"""Reproduce **Table 1** (§7.2): workload response time, container vs LLAP.

    spark-submit jobs/table1_llap.py [SF] [RUNS]
"""
import sys
import tempfile

from _common import get_spark

from repro.experiments import format_rows, table1_llap


def main() -> None:
    sf = float(sys.argv[1]) if len(sys.argv) > 1 else 0.05
    runs = int(sys.argv[2]) if len(sys.argv) > 2 else 2
    spark = get_spark("table1_llap")
    with tempfile.TemporaryDirectory() as d:
        print(format_rows(table1_llap(spark, d, sf=sf, runs=runs)))
    spark.stop()


if __name__ == "__main__":
    main()
