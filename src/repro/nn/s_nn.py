"""S-NN: recompute the join on the fly every epoch, dense math per tuple.

Second baseline of Section VI: no materialization; each epoch re-executes the
Catalyst shuffle join (fresh plan per epoch, so nothing is reused) and runs
the unfactorized forward/backward over the wide joined rows.
"""
from __future__ import annotations

import time

from pyspark.sql import DataFrame, SparkSession

from repro.core.aggregate import aggregate_partitions
from repro.core.nn_ref import apply_gradients
from repro.core.params import NNParams, TrainResult
from repro.core.relational import as_list, denormalize, infer_dims, joined_feature_cols
from repro.nn.m_nn import _dense_batch_fn
from repro.nn.model import dense_grad_layout, finalize_dense


def train_s_nn(
    spark: SparkSession,
    s_df: DataFrame,
    r_dfs,
    *,
    init: NNParams,
    epochs: int = 10,
    lr: float = 0.1,
    activation: str = "sigmoid",
) -> TrainResult:
    """Train the network with the join streamed per epoch (S-NN)."""
    r_dfs = as_list(r_dfs)
    d_s, d_rs = infer_dims(s_df, r_dfs)
    feat_cols = joined_feature_cols(d_s, d_rs)

    p = init.copy()
    layout = dense_grad_layout(p.nh, p.d)
    history: list[float] = []
    t0 = time.perf_counter()
    for _ in range(epochs):
        t_df = denormalize(s_df, r_dfs, extra_cols=["y"]).select("y", *feat_cols)
        flat = aggregate_partitions(
            t_df, _dense_batch_fn(p, activation, feat_cols, layout), layout.size
        )
        grads, loss = finalize_dense(layout.unpack(flat))
        history.append(loss)
        p = apply_gradients(p, grads, lr)
    t_train = time.perf_counter() - t0
    return TrainResult(
        params=p,
        history=history,
        timings={"materialize": 0.0, "train": t_train, "total": t_train},
    )
