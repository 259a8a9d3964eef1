"""GMM sufficient statistics: dense (M/S) and factorized (F) forms.

The dense form is the baselines' per-pass computation over joined tuples:
``(Nk, sum gamma x, sum gamma x x^T)`` at O(N d^2).

The factorized form is the paper's Section V decomposition: the only
statistics accumulated over the fact table are

* ``nk, ll`` — component masses and the running log-likelihood (Eq. 5-6);
* ``a = sum gamma x_S``, ``b = sum gamma x_S x_S^T`` — the S-side blocks;
* per attribute table t: ``g_t[k, r] = sum_{n: fk_t(n)=r} gamma_nk`` — the
  per-FK responsibility masses (the paper's reuse counts), and
  ``h_t[k, r, :] = sum_{n: fk_t(n)=r} gamma_nk x_S`` — for the S-R_t cross
  scatter block (Eq. 16-17);
* per table pair a<b: ``c_ab[k, r, :] = sum_{n: fk_a=r} gamma_nk x_Rb[fk_b]``
  — for the R_a-R_b cross blocks of the multi-way scatter (Eq. 23-24).

``assemble_moments`` then reconstitutes the full-d raw moments with one small
matmul per block against the dimension tables' feature matrices — each R tuple
participates exactly once, which is precisely the factorization's saving.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.aggregate import StatLayout
from repro.core.em_ref import dense_suffstats
from repro.core.linalg import (
    MultiwayTerms,
    dense_quadratic,
    factorized_quadratic_multiway,
    log_responsibilities,
    precisions_and_logdets,
)
from repro.core.params import GMMParams


def gmm_payload(params: GMMParams) -> dict:
    """Driver-side per-iteration derivations shared by all trainers."""
    prec, logdet = precisions_and_logdets(params.sigma)
    return {
        "pi": params.pi,
        "mu": params.mu,
        "prec": prec,
        "logdet": logdet,
        "d": params.d,
    }


# ---------------------------------------------------------------------------
# Dense (M-GMM / S-GMM)
# ---------------------------------------------------------------------------


def dense_layout(k: int, d: int) -> StatLayout:
    return StatLayout({"nk": (k,), "sx": (k, d), "sxx": (k, d, d), "ll": ()})


def make_dense_batch_fn(payload: dict, feat_cols: list[str], layout: StatLayout):
    """Batch -> flat dense stats, evaluating gamma on the wide joined rows."""

    def batch_fn(pdf: pd.DataFrame) -> np.ndarray:
        x = pdf[feat_cols].to_numpy(dtype=np.float64)
        quad = dense_quadratic(x, payload["mu"], payload["prec"])
        gamma, ll = log_responsibilities(
            quad, payload["pi"], payload["logdet"], payload["d"]
        )
        nk, sx, sxx = dense_suffstats(x, gamma)
        return layout.pack({"nk": nk, "sx": sx, "sxx": sxx, "ll": ll.sum()})

    return batch_fn


# ---------------------------------------------------------------------------
# Factorized (F-GMM)
# ---------------------------------------------------------------------------


def factorized_layout(k: int, d_s: int, n_rs: list[int], d_rs: list[int]) -> StatLayout:
    shapes: dict[str, tuple] = {
        "nk": (k,),
        "a": (k, d_s),
        "b": (k, d_s, d_s),
        "ll": (),
    }
    q = len(n_rs)
    for t in range(1, q + 1):
        shapes[f"g{t}"] = (k, n_rs[t - 1])
        shapes[f"h{t}"] = (k, n_rs[t - 1], d_s)
    for a in range(1, q + 1):
        for b in range(a + 1, q + 1):
            shapes[f"c{a}_{b}"] = (k, n_rs[a - 1], d_rs[b - 1])
    return StatLayout(shapes)


def _segment_sums(
    fk_idx: np.ndarray, weights: np.ndarray, values: np.ndarray | None, n_r: int
) -> np.ndarray:
    """``out[r, :] = sum_{n: fk=r} weights_n * values_n`` via bincount.

    ``values=None`` means scalar 1s (returns shape (n_r,)).
    """
    if values is None:
        return np.bincount(fk_idx, weights=weights, minlength=n_r)
    out = np.empty((n_r, values.shape[1]))
    for j in range(values.shape[1]):
        out[:, j] = np.bincount(fk_idx, weights=weights * values[:, j], minlength=n_r)
    return out


def make_factorized_batch_fn(
    payload: dict,
    terms: MultiwayTerms,
    xrs: list[np.ndarray],
    s_cols: list[str],
    fk_names: list[str],
    layout: StatLayout,
):
    """Batch of *S tuples only* -> flat factorized stats.

    The E-step uses the factorized quadratic form (per-R-tuple ``terms``
    precomputed once on the driver); the M-step contributions are the small
    per-FK aggregates described in the module docstring. No wide joined row is
    ever formed.
    """
    k = payload["mu"].shape[0]
    q = len(xrs)
    n_rs = [xr.shape[0] for xr in xrs]

    def batch_fn(pdf: pd.DataFrame) -> np.ndarray:
        xs = pdf[s_cols].to_numpy(dtype=np.float64)
        fk_idx = [pdf[name].to_numpy(dtype=np.int64) - 1 for name in fk_names]
        quad = factorized_quadratic_multiway(
            xs, fk_idx, payload["mu"], payload["prec"], terms
        )
        gamma, ll = log_responsibilities(
            quad, payload["pi"], payload["logdet"], payload["d"]
        )
        stats: dict[str, np.ndarray] = {
            "nk": gamma.sum(axis=0),
            "a": gamma.T @ xs,
            "ll": ll.sum(),
        }
        b = np.empty((k, xs.shape[1], xs.shape[1]))
        for i in range(k):
            b[i] = xs.T @ (gamma[:, i : i + 1] * xs)
        stats["b"] = b
        for t in range(1, q + 1):
            g = np.empty((k, n_rs[t - 1]))
            h = np.empty((k, n_rs[t - 1], xs.shape[1]))
            for i in range(k):
                g[i] = _segment_sums(fk_idx[t - 1], gamma[:, i], None, n_rs[t - 1])
                h[i] = _segment_sums(fk_idx[t - 1], gamma[:, i], xs, n_rs[t - 1])
            stats[f"g{t}"] = g
            stats[f"h{t}"] = h
        for a in range(1, q + 1):
            for bt in range(a + 1, q + 1):
                xb = xrs[bt - 1][fk_idx[bt - 1]]  # (B, dRb) gathered once
                c = np.empty((k, n_rs[a - 1], xb.shape[1]))
                for i in range(k):
                    c[i] = _segment_sums(fk_idx[a - 1], gamma[:, i], xb, n_rs[a - 1])
                stats[f"c{a}_{bt}"] = c
        return layout.pack(stats)

    return batch_fn


def assemble_moments(
    stats: dict[str, np.ndarray], xrs: list[np.ndarray]
) -> tuple[np.ndarray, np.ndarray, np.ndarray, float]:
    """Reconstitute full-d raw moments from factorized stats (Eq. 13-24).

    Each dimension-table feature matrix enters once per block: O(nR) work in
    place of the baselines' O(N) — the M-step side of F-GMM's savings.
    Returns ``(nk, sx (K,d), sxx (K,d,d), ll)``.
    """
    q = len(xrs)
    k, d_s = stats["a"].shape
    d_rs = [xr.shape[1] for xr in xrs]
    d = d_s + sum(d_rs)
    off = [d_s]
    for dr in d_rs:
        off.append(off[-1] + dr)
    sx = np.zeros((k, d))
    sxx = np.zeros((k, d, d))
    sx[:, :d_s] = stats["a"]
    sxx[:, :d_s, :d_s] = stats["b"]
    for t in range(1, q + 1):
        lo, hi = off[t - 1], off[t]
        xr = xrs[t - 1]
        g = stats[f"g{t}"]  # (K, nRt)
        h = stats[f"h{t}"]  # (K, nRt, dS)
        for i in range(k):
            sx[i, lo:hi] = g[i] @ xr
            sr = h[i].T @ xr  # (dS, dRt): sum gamma x_S x_Rt^T
            sxx[i, :d_s, lo:hi] = sr
            sxx[i, lo:hi, :d_s] = sr.T
            sxx[i, lo:hi, lo:hi] = xr.T @ (g[i][:, None] * xr)
    for a in range(1, q + 1):
        for bt in range(a + 1, q + 1):
            alo, ahi = off[a - 1], off[a]
            blo, bhi = off[bt - 1], off[bt]
            c = stats[f"c{a}_{bt}"]  # (K, nRa, dRb)
            xa = xrs[a - 1]
            for i in range(k):
                ab = xa.T @ c[i]  # (dRa, dRb)
                sxx[i, alo:ahi, blo:bhi] = ab
                sxx[i, blo:bhi, alo:ahi] = ab.T
    return stats["nk"], sx, sxx, float(stats["ll"])
