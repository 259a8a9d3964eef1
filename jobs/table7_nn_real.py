"""Reproduce Table VII: M/S/F-NN runtimes on the simulated sparse datasets."""
from repro.bench.harness import format_rows, warmup
from repro.bench.session import get_spark
from repro.bench.tables import PAPER_TABLE7, table7_rows


def main() -> None:
    spark = get_spark("table7-nn")
    warmup(spark)
    rows = table7_rows(spark)
    print(format_rows(rows, "Table VII — NN on (simulated) sparse datasets [measured]"))
    print("\nPaper numbers (seconds, authors' testbed):")
    for ds, algs in PAPER_TABLE7.items():
        print(f"  {ds:24s} " + "  ".join(f"{a}={t}" for a, t in algs.items()))
    spark.stop()


if __name__ == "__main__":
    main()
