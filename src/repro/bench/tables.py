"""Workload definitions for every evaluation artifact (DESIGN.md Section 4).

Each ``*_rows`` function reproduces one table/figure of the paper: it
generates the (scaled) datasets, runs the M/S/F matrix through the harness
and returns the measured rows. The paper's published numbers are kept here
(``PAPER_TABLE6`` / ``PAPER_TABLE7``) so EXPERIMENTS.md and the jobs can
print paper-vs-measured side by side.

Scaling: real-dataset simulations run at ``realsim.ROW_SCALE`` row scale with
exact paper feature dimensions; synthetic sweeps use nR=200 (paper: 1000) and
nS up to 1e5 (paper: up to 5e6) — the sweep *axes* (rr, dR, K, nh) are the
paper's. Iteration counts are fixed and identical across algorithms (GMM: 5
for Table VI / 3 for sweeps; NN epochs likewise), so the ratios the paper
reports are comparable even though absolute seconds are not.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.bench.harness import Row, run_gmm_matrix, run_nn_matrix
from repro.data import realsim
from repro.data.normalized import binary_relations_pdf, multiway_relations_pdf

TABLE_ITERS = 5  # Table VI GMM iterations / Table VII NN epochs
SWEEP_ITERS = 3  # figure sweeps

# Paper numbers (seconds) — Table VI and VII verbatim, for EXPERIMENTS.md.
PAPER_TABLE6 = {
    "Expedia1(Not Sparse)": {"M-GMM": 2140.1, "S-GMM": 2244.3, "F-GMM": 1014.2},
    "Expedia2(Not Sparse)": {"M-GMM": 1221.1, "S-GMM": 1248.5, "F-GMM": 593.1},
    "Walmart (Not Sparse)": {"M-GMM": 595.9, "S-GMM": 602.9, "F-GMM": 212.1},
    "Movies (Not Sparse)": {"M-GMM": 1691.7, "S-GMM": 1755.8, "F-GMM": 514.6},
    "Expedia3 (Augmented)": {"M-GMM": 1673.5, "S-GMM": 1750.9, "F-GMM": 639.3},
    "Expedia4 (Augmented)": {"M-GMM": 6129.6, "S-GMM": 6311.4, "F-GMM": 1843.3},
    "Expedia5 (Augmented)": {"M-GMM": 23270.6, "S-GMM": 23375.1, "F-GMM": 9779.3},
    "Movies-3way": {"M-GMM": 2455.3, "S-GMM": 2883.1, "F-GMM": 715.1},
}
PAPER_TABLE7 = {
    "Walmart (Sparse)": {"M-NN": 743.1, "S-NN": 845.5, "F-NN": 104.1},
    "Movies (Sparse)": {"M-NN": 437.4, "S-NN": 507.2, "F-NN": 112.3},
    "Movies-3way": {"M-NN": 890.1, "S-NN": 1022.3, "F-NN": 202.1},
}


# ---------------------------------------------------------------------------
# Result tables (VI, VII)
# ---------------------------------------------------------------------------


def table6_rows(
    spark: SparkSession,
    scale: float = realsim.ROW_SCALE,
    iters: int = TABLE_ITERS,
    datasets: list[str] | None = None,
) -> list[Row]:
    """Table VI: GMM on the simulated real datasets (K=5)."""
    rows: list[Row] = []
    for name, spec in realsim.GMM_REAL.items():
        if datasets is not None and name not in datasets:
            continue
        s_pdf, r_pdfs = spec.generate_pdf(scale)
        rows += run_gmm_matrix(spark, name, s_pdf, r_pdfs, k=5, iters=iters)
    return rows


def table7_rows(
    spark: SparkSession,
    scale: float = realsim.ROW_SCALE,
    epochs: int = TABLE_ITERS,
    datasets: list[str] | None = None,
) -> list[Row]:
    """Table VII: NN on the simulated sparse datasets (nh=50, sigmoid)."""
    rows: list[Row] = []
    for name, spec in realsim.NN_REAL.items():
        if datasets is not None and name not in datasets:
            continue
        s_pdf, r_pdfs = spec.generate_pdf(scale)
        rows += run_nn_matrix(spark, name, s_pdf, r_pdfs, nh=50, epochs=epochs)
    return rows


# ---------------------------------------------------------------------------
# Figure sweeps (3-6) as tables — scaled synthetic grids on the paper's axes
# ---------------------------------------------------------------------------

_SWEEP_NR = 200  # paper: nR = 1000
_SWEEP_NS = 100_000  # paper: nS = 1e6


def fig3_rows(spark: SparkSession, iters: int = SWEEP_ITERS) -> list[Row]:
    """Fig. 3: GMM binary-join sweeps — vary rr, vary dR, vary K."""
    rows: list[Row] = []
    for rr in (50, 500):  # (a) vary rr, for dR in {5, 15}
        for d_r in (5, 15):
            s, r = binary_relations_pdf(
                n_s=rr * _SWEEP_NR, n_r=_SWEEP_NR, d_s=5, d_r=d_r, seed=21
            )
            rows += run_gmm_matrix(
                spark, f"rr={rr},dR={d_r}", s, [r], k=5, iters=iters
            )
    for d_r in (5, 15, 30):  # (b) vary dR at rr=500
        s, r = binary_relations_pdf(
            n_s=_SWEEP_NS, n_r=_SWEEP_NR, d_s=5, d_r=d_r, seed=22
        )
        rows += run_gmm_matrix(spark, f"dR={d_r}", s, [r], k=5, iters=iters)
    for k in (2, 8):  # (c) vary K at dR=15
        s, r = binary_relations_pdf(
            n_s=_SWEEP_NS, n_r=_SWEEP_NR, d_s=5, d_r=15, seed=23
        )
        rows += run_gmm_matrix(spark, f"K={k}", s, [r], k=k, iters=iters)
    return rows


def fig4_rows(spark: SparkSession, iters: int = SWEEP_ITERS) -> list[Row]:
    """Fig. 4: GMM multi-way (q=2) sweeps — vary rr, vary dR1, vary K."""
    rows: list[Row] = []
    for rr in (100, 500):  # (a)
        s, rs = multiway_relations_pdf(
            n_s=rr * _SWEEP_NR, n_rs=[_SWEEP_NR, 100], d_s=2, d_rs=[15, 8], seed=31
        )
        rows += run_gmm_matrix(spark, f"3way rr={rr}", s, rs, k=5, iters=iters)
    for d_r1 in (5, 30):  # (b)
        s, rs = multiway_relations_pdf(
            n_s=_SWEEP_NS, n_rs=[_SWEEP_NR, 100], d_s=2, d_rs=[d_r1, 8], seed=32
        )
        rows += run_gmm_matrix(spark, f"3way dR1={d_r1}", s, rs, k=5, iters=iters)
    for k in (2, 8):  # (c)
        s, rs = multiway_relations_pdf(
            n_s=_SWEEP_NS, n_rs=[_SWEEP_NR, 100], d_s=2, d_rs=[15, 8], seed=33
        )
        rows += run_gmm_matrix(spark, f"3way K={k}", s, rs, k=k, iters=iters)
    return rows


def fig5_rows(spark: SparkSession, epochs: int = SWEEP_ITERS) -> list[Row]:
    """Fig. 5: NN binary-join sweeps — vary rr, vary dR, vary nh."""
    rows: list[Row] = []
    for rr in (50, 500):  # (a)
        for d_r in (5, 15):
            s, r = binary_relations_pdf(
                n_s=rr * _SWEEP_NR, n_r=_SWEEP_NR, d_s=5, d_r=d_r, seed=41, target=True
            )
            rows += run_nn_matrix(
                spark, f"rr={rr},dR={d_r}", s, [r], nh=50, epochs=epochs
            )
    for d_r in (5, 15, 30):  # (b)
        s, r = binary_relations_pdf(
            n_s=_SWEEP_NS, n_r=_SWEEP_NR, d_s=5, d_r=d_r, seed=42, target=True
        )
        rows += run_nn_matrix(spark, f"dR={d_r}", s, [r], nh=50, epochs=epochs)
    for nh in (25, 100):  # (c)
        s, r = binary_relations_pdf(
            n_s=_SWEEP_NS, n_r=_SWEEP_NR, d_s=5, d_r=15, seed=43, target=True
        )
        rows += run_nn_matrix(spark, f"nh={nh}", s, [r], nh=nh, epochs=epochs)
    return rows


def fig6_rows(spark: SparkSession, epochs: int = SWEEP_ITERS) -> list[Row]:
    """Fig. 6: NN multi-way (q=2) sweeps — vary rr, vary dR1, vary nh."""
    rows: list[Row] = []
    for rr in (100, 500):  # (a)
        s, rs = multiway_relations_pdf(
            n_s=rr * _SWEEP_NR,
            n_rs=[_SWEEP_NR, 100],
            d_s=2,
            d_rs=[15, 8],
            seed=51,
            target=True,
        )
        rows += run_nn_matrix(spark, f"3way rr={rr}", s, rs, nh=50, epochs=epochs)
    for d_r1 in (5, 30):  # (b)
        s, rs = multiway_relations_pdf(
            n_s=_SWEEP_NS,
            n_rs=[_SWEEP_NR, 100],
            d_s=2,
            d_rs=[d_r1, 8],
            seed=52,
            target=True,
        )
        rows += run_nn_matrix(spark, f"3way dR1={d_r1}", s, rs, nh=50, epochs=epochs)
    for nh in (25, 100):  # (c)
        s, rs = multiway_relations_pdf(
            n_s=_SWEEP_NS,
            n_rs=[_SWEEP_NR, 100],
            d_s=2,
            d_rs=[15, 8],
            seed=53,
            target=True,
        )
        rows += run_nn_matrix(spark, f"3way nh={nh}", s, rs, nh=nh, epochs=epochs)
    return rows
