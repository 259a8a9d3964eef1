"""Reproduce Fig. 3 (as a table): GMM binary-join synthetic sweeps."""
from repro.bench.harness import format_rows, warmup
from repro.bench.session import get_spark
from repro.bench.tables import fig3_rows


def main() -> None:
    spark = get_spark("fig3-gmm")
    warmup(spark)
    print(format_rows(fig3_rows(spark), "Fig. 3 — GMM synthetic sweeps (vary rr / dR / K)"))
    spark.stop()


if __name__ == "__main__":
    main()
