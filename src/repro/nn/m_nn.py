"""M-NN: materialize the join, train the network over the stored wide table.

Baseline of Section VI: ``T`` (including the target ``y``) is computed and
written to Parquet once; every epoch re-reads the wide table and computes the
dense full-batch gradients (Eq. 28 before decomposition).
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.aggregate import aggregate_partitions
from repro.core.nn_ref import ACTIVATIONS, apply_gradients
from repro.core.params import NNParams, TrainResult
from repro.core.relational import as_list, denormalize, infer_dims, joined_feature_cols
from repro.nn.model import dense_grad_layout, dense_grad_stats, finalize_dense


def _dense_batch_fn(p: NNParams, act_name: str, feat_cols, layout):
    act = ACTIVATIONS[act_name]

    def batch_fn(pdf: pd.DataFrame) -> np.ndarray:
        x = pdf[feat_cols].to_numpy(dtype=np.float64)
        y = pdf["y"].to_numpy(dtype=np.float64)
        return layout.pack(dense_grad_stats(x, y, p, act))

    return batch_fn


def train_m_nn(
    spark: SparkSession,
    s_df: DataFrame,
    r_dfs,
    *,
    init: NNParams,
    epochs: int = 10,
    lr: float = 0.1,
    activation: str = "sigmoid",
    tmpdir: str,
) -> TrainResult:
    """Train the 1-hidden-layer network over a materialized join (M-NN)."""
    r_dfs = as_list(r_dfs)
    d_s, d_rs = infer_dims(s_df, r_dfs)
    feat_cols = joined_feature_cols(d_s, d_rs)
    path = f"{tmpdir}/m_nn_T.parquet"

    t0 = time.perf_counter()
    denormalize(s_df, r_dfs, extra_cols=["y"]).write.mode("overwrite").parquet(path)
    t_mat = time.perf_counter() - t0

    p = init.copy()
    layout = dense_grad_layout(p.nh, p.d)
    history: list[float] = []
    t1 = time.perf_counter()
    for _ in range(epochs):
        t_df = spark.read.parquet(path).select("y", *feat_cols)
        flat = aggregate_partitions(
            t_df, _dense_batch_fn(p, activation, feat_cols, layout), layout.size
        )
        grads, loss = finalize_dense(layout.unpack(flat))
        history.append(loss)
        p = apply_gradients(p, grads, lr)
    t_train = time.perf_counter() - t1
    return TrainResult(
        params=p,
        history=history,
        timings={"materialize": t_mat, "train": t_train, "total": t_mat + t_train},
    )
