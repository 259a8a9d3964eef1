"""S-GMM: stream the join — recompute it on the fly every EM pass.

The paper's second baseline: nothing is materialized; each pass re-executes
the PK/FK join (here: the Catalyst shuffle join, rebuilt from the base
DataFrames each iteration so Spark cannot reuse a cached plan or shuffle) and
feeds the wide joined tuples to the *unfactorized* per-tuple math. Same
computation cost as M-GMM, join cost paid ``iters`` times instead of
storage + wide re-reads.
"""
from __future__ import annotations

import time

from pyspark.sql import DataFrame, SparkSession

from repro.core.aggregate import aggregate_partitions
from repro.core.em_ref import mstep_from_moments
from repro.core.params import GMMParams, TrainResult
from repro.core.relational import as_list, denormalize, infer_dims, joined_feature_cols
from repro.gmm.suffstats import dense_layout, gmm_payload, make_dense_batch_fn


def train_s_gmm(
    spark: SparkSession,
    s_df: DataFrame,
    r_dfs,
    *,
    init: GMMParams,
    iters: int = 10,
    reg_covar: float = 1e-6,
    tol: float | None = None,
) -> TrainResult:
    """Train a GMM with the join computed on the fly each pass (S-GMM)."""
    r_dfs = as_list(r_dfs)
    d_s, d_rs = infer_dims(s_df, r_dfs)
    feat_cols = joined_feature_cols(d_s, d_rs)

    params = init.copy()
    layout = dense_layout(params.k, params.d)
    n_total = None
    history: list[float] = []
    t0 = time.perf_counter()
    for _ in range(iters):
        # A fresh join plan per pass: the shuffle executes every iteration.
        t_df = denormalize(s_df, r_dfs).select(*feat_cols)
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
    t_train = time.perf_counter() - t0
    return TrainResult(
        params=params,
        history=history,
        timings={"materialize": 0.0, "train": t_train, "total": t_train},
    )
