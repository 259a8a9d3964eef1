"""Reproduce Fig. 4 (as a table): GMM multi-way-join synthetic sweeps."""
from repro.bench.harness import format_rows, warmup
from repro.bench.session import get_spark
from repro.bench.tables import fig4_rows


def main() -> None:
    spark = get_spark("fig4-gmm")
    warmup(spark)
    print(format_rows(fig4_rows(spark), "Fig. 4 — GMM multi-way sweeps (vary rr / dR1 / K)"))
    spark.stop()


if __name__ == "__main__":
    main()
