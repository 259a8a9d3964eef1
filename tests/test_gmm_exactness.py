"""The paper's central GMM claim: M-GMM, S-GMM and F-GMM produce the *same*
model as each other and as the single-node reference EM on the densified
table — "without any loss in accuracy" (Sections V-B, VII).

Each configuration's trainers run once in a module-scoped fixture; the tests
then assert the individual agreement properties.
"""
import numpy as np
import pytest

from repro.core.em_ref import em_fit
from repro.core.params import init_gmm
from repro.data.normalized import binary_relations_pdf, densify_pdf, to_spark
from repro.gmm import train_f_gmm, train_m_gmm, train_s_gmm

CONFIGS = {
    "small": dict(n_s=1500, n_r=30, d_s=3, d_r=4, k=3, iters=4, seed=0),
    "k1": dict(n_s=1000, n_r=10, d_s=2, d_r=2, k=1, iters=3, seed=1),
    "wide_r": dict(n_s=1200, n_r=15, d_s=2, d_r=12, k=2, iters=3, seed=2),
    "rr_one": dict(n_s=400, n_r=400, d_s=3, d_r=3, k=2, iters=3, seed=3),
}


@pytest.fixture(scope="module", params=list(CONFIGS), ids=list(CONFIGS))
def trained(request, spark, tmp_path_factory):
    cfg = CONFIGS[request.param]
    s_pdf, r_pdf = binary_relations_pdf(
        n_s=cfg["n_s"], n_r=cfg["n_r"], d_s=cfg["d_s"], d_r=cfg["d_r"], seed=cfg["seed"]
    )
    x, _ = densify_pdf(s_pdf, r_pdf)
    init = init_gmm(cfg["d_s"] + cfg["d_r"], cfg["k"], cfg["seed"] + 10)
    ref = em_fit(x, init, iters=cfg["iters"])
    s_df, r_df = to_spark(spark, s_pdf), to_spark(spark, r_pdf)
    tmpdir = str(tmp_path_factory.mktemp(f"mgmm_{request.param}"))
    results = {
        "M": train_m_gmm(spark, s_df, r_df, init=init, iters=cfg["iters"], tmpdir=tmpdir),
        "S": train_s_gmm(spark, s_df, r_df, init=init, iters=cfg["iters"]),
        "F": train_f_gmm(spark, s_df, r_df, init=init, iters=cfg["iters"]),
    }
    return cfg, ref, results


ALGOS = ["M", "S", "F"]


@pytest.mark.parametrize("algo", ALGOS)
def test_means_match_reference(trained, algo):
    _, ref, results = trained
    np.testing.assert_allclose(
        results[algo].params.mu, ref.params.mu, rtol=1e-8, atol=1e-10
    )


@pytest.mark.parametrize("algo", ALGOS)
def test_covariances_match_reference(trained, algo):
    _, ref, results = trained
    np.testing.assert_allclose(
        results[algo].params.sigma, ref.params.sigma, rtol=1e-7, atol=1e-10
    )


@pytest.mark.parametrize("algo", ALGOS)
def test_mixing_weights_match_reference(trained, algo):
    _, ref, results = trained
    np.testing.assert_allclose(results[algo].params.pi, ref.params.pi, rtol=1e-9)


@pytest.mark.parametrize("algo", ALGOS)
def test_loglik_trajectory_matches_reference(trained, algo):
    """Not just the final model: the whole per-iteration trajectory (Eq. 6)."""
    cfg, ref, results = trained
    assert len(results[algo].history) == cfg["iters"]
    np.testing.assert_allclose(results[algo].history, ref.history, rtol=1e-9)


def test_all_three_algorithms_pairwise_identical(trained):
    _, _, results = trained
    for a in ("S", "F"):
        np.testing.assert_allclose(
            results[a].params.mu, results["M"].params.mu, rtol=1e-8, atol=1e-10
        )
        np.testing.assert_allclose(
            results[a].params.sigma, results["M"].params.sigma, rtol=1e-7, atol=1e-10
        )


def test_loglik_monotone_on_spark_trainers(trained):
    _, _, results = trained
    for res in results.values():
        h = np.array(res.history)
        assert np.all(np.diff(h) >= -1e-6 * np.abs(h[:-1]))


def test_timings_recorded(trained):
    _, _, results = trained
    assert results["M"].timings["materialize"] > 0
    for algo in ("S", "F"):
        assert results[algo].timings["materialize"] == 0.0
    for res in results.values():
        assert res.timings["total"] > 0
