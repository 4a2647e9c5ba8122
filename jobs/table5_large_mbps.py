"""Job: Table 5 (paper Fig 10) — enumerating large MBPs (size >= theta).

iTraversal-theta vs iMB-theta after (theta-k)-core preprocessing, plus
the partition-parallel Spark enumerator where its exactness bound holds.

Usage: spark-submit jobs/table5_large_mbps.py [--budget 120] [--no-spark]
"""
import argparse

from _common import emit, get_spark

from repro.experiments.harness import format_table
from repro.experiments.tables import table5_large_mbps


def main(argv=None):
    ap = argparse.ArgumentParser()
    ap.add_argument("--budget", type=float, default=120.0)
    ap.add_argument("--datasets", nargs="+", default=["Cfat", "Marvel"])
    ap.add_argument("--thetas", type=int, nargs="+", default=[3, 4, 5, 6])
    ap.add_argument("--no-spark", action="store_true")
    args = ap.parse_args(argv)
    spark = None if args.no_spark else get_spark("table5")
    rows = table5_large_mbps(
        tuple(args.datasets), thetas=tuple(args.thetas),
        budget_s=args.budget, spark=spark,
    )
    emit("table5", format_table(
        rows, "Table 5 (Fig 10): enumerating large MBPs"))
    if spark is not None:
        spark.stop()
    return rows


if __name__ == "__main__":
    main()
