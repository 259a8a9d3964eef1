"""M-GMM: materialize the join, then train over the stored wide table.

The paper's Algorithm 1: compute ``T = S join R1 ... Rq``, store it (here:
Parquet on local disk, the Spark analogue of "materialize the table in the
database"), then run EM re-reading the wide table every pass. Pays the join
once plus ``|T|`` of storage and a wide scan per pass.
"""
from __future__ import annotations

import time

from pyspark.sql import DataFrame, SparkSession

from repro.core.aggregate import aggregate_partitions
from repro.core.em_ref import mstep_from_moments
from repro.core.params import GMMParams, TrainResult
from repro.core.relational import as_list, denormalize, infer_dims, joined_feature_cols
from repro.gmm.suffstats import dense_layout, gmm_payload, make_dense_batch_fn


def train_m_gmm(
    spark: SparkSession,
    s_df: DataFrame,
    r_dfs,
    *,
    init: GMMParams,
    iters: int = 10,
    tmpdir: str,
    reg_covar: float = 1e-6,
    tol: float | None = None,
) -> TrainResult:
    """Train a GMM via materialized denormalization (baseline M-GMM)."""
    r_dfs = as_list(r_dfs)
    d_s, d_rs = infer_dims(s_df, r_dfs)
    feat_cols = joined_feature_cols(d_s, d_rs)
    path = f"{tmpdir}/m_gmm_T.parquet"

    t0 = time.perf_counter()
    denormalize(s_df, r_dfs).write.mode("overwrite").parquet(path)
    t_mat = time.perf_counter() - t0

    params = init.copy()
    layout = dense_layout(params.k, params.d)
    n_total = None
    history: list[float] = []
    t1 = time.perf_counter()
    for _ in range(iters):
        # Re-read the wide materialized table every pass, as Algorithm 1 does.
        t_df = spark.read.parquet(path).select(*feat_cols)
        payload = gmm_payload(params)
        flat = aggregate_partitions(
            t_df, make_dense_batch_fn(payload, feat_cols, layout), layout.size
        )
        stats = layout.unpack(flat)
        if n_total is None:
            n_total = float(stats["nk"].sum())
        ll = float(stats["ll"])
        params = mstep_from_moments(
            stats["nk"], stats["sx"], stats["sxx"], n_total, reg_covar
        )
        if tol is not None and history and abs(ll - history[-1]) < tol:
            history.append(ll)
            break
        history.append(ll)
    t_train = time.perf_counter() - t1
    return TrainResult(
        params=params,
        history=history,
        timings={"materialize": t_mat, "train": t_train, "total": t_mat + t_train},
    )
