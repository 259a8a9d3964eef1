"""Reproduce Fig. 6 (as a table): NN multi-way-join synthetic sweeps."""
from repro.bench.harness import format_rows, warmup
from repro.bench.session import get_spark
from repro.bench.tables import fig6_rows


def main() -> None:
    spark = get_spark("fig6-nn")
    warmup(spark)
    print(format_rows(fig6_rows(spark), "Fig. 6 — NN multi-way sweeps (vary rr / dR1 / nh)"))
    spark.stop()


if __name__ == "__main__":
    main()
