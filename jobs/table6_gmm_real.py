"""Reproduce Table VI: M/S/F-GMM runtimes on the simulated real datasets.

Usage: spark-submit jobs/table6_gmm_real.py  (or plain `python`).
Prints measured seconds next to the paper's numbers.
"""
from repro.bench.harness import format_rows, warmup
from repro.bench.session import get_spark
from repro.bench.tables import PAPER_TABLE6, table6_rows


def main() -> None:
    spark = get_spark("table6-gmm")
    warmup(spark)
    rows = table6_rows(spark)
    print(format_rows(rows, "Table VI — GMM on (simulated) real datasets [measured]"))
    print("\nPaper numbers (seconds, authors' testbed):")
    for ds, algs in PAPER_TABLE6.items():
        print(f"  {ds:24s} " + "  ".join(f"{a}={t}" for a, t in algs.items()))
    spark.stop()


if __name__ == "__main__":
    main()
