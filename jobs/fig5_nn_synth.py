"""Reproduce Fig. 5 (as a table): NN binary-join synthetic sweeps."""
from repro.bench.harness import format_rows, warmup
from repro.bench.session import get_spark
from repro.bench.tables import fig5_rows


def main() -> None:
    spark = get_spark("fig5-nn")
    warmup(spark)
    print(format_rows(fig5_rows(spark), "Fig. 5 — NN synthetic sweeps (vary rr / dR / nh)"))
    spark.stop()


if __name__ == "__main__":
    main()
