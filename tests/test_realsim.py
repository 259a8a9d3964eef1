"""Simulated real datasets must match the paper's Tables IV and V dimensions."""
import numpy as np
import pytest

from repro.data import realsim
from repro.data.normalized import r_feature_cols, s_feature_cols

# (dataset, nS, dS, [nR...], [dR...]) straight from Tables IV / V
TABLE_IV_V = [
    ("Expedia1(Not Sparse)", 942142, 7, [11938], [8]),
    ("Expedia2(Not Sparse)", 942142, 7, [37021], [14]),
    ("Walmart (Not Sparse)", 421570, 3, [2340], [9]),
    ("Movies (Not Sparse)", 1000209, 1, [3706], [21]),
    ("Expedia3 (Augmented)", 634133, 7, [2899], [29]),
    ("Expedia4 (Augmented)", 634133, 7, [2899], [78]),
    ("Expedia5 (Augmented)", 634133, 7, [2899], [218]),
]
TABLE_IV_SPARSE = [
    ("Walmart (Sparse)", 421570, 126, [2340], [175]),
    ("Movies (Sparse)", 1000209, 1, [3706], [21]),
]


@pytest.mark.parametrize("name,n_s,d_s,n_rs,d_rs", TABLE_IV_V)
def test_gmm_specs_match_paper(name, n_s, d_s, n_rs, d_rs):
    spec = realsim.GMM_REAL[name]
    assert spec.n_s == n_s
    assert spec.d_s == d_s
    assert list(spec.n_rs) == n_rs
    assert list(spec.d_rs) == d_rs
    assert not spec.target  # GMM is unsupervised


@pytest.mark.parametrize("name,n_s,d_s,n_rs,d_rs", TABLE_IV_SPARSE)
def test_nn_specs_match_paper(name, n_s, d_s, n_rs, d_rs):
    spec = realsim.NN_REAL[name]
    assert (spec.n_s, spec.d_s) == (n_s, d_s)
    assert list(spec.n_rs) == n_rs and list(spec.d_rs) == d_rs
    assert spec.target


def test_movies_3way_is_two_attribute_tables():
    for reg in (realsim.GMM_REAL, realsim.NN_REAL):
        spec = reg["Movies-3way"]
        assert spec.q == 2
        assert spec.n_rs == (6040, 3706)
        assert spec.d_rs[1] == 21  # movies width from Table IV


@pytest.mark.parametrize("name", list(realsim.GMM_REAL))
def test_scaled_preserves_rr(name):
    """Scaling must preserve the tuple ratio rr = nS/nR within rounding."""
    spec = realsim.GMM_REAL[name]
    kw = spec.scaled(0.1)
    for n_r_paper, n_r_scaled in zip(spec.n_rs, kw["n_rs"]):
        rr_paper = spec.n_s / n_r_paper
        rr_scaled = kw["n_s"] / n_r_scaled
        assert rr_scaled == pytest.approx(rr_paper, rel=0.02)


@pytest.mark.parametrize("name", ["Walmart (Not Sparse)", "Movies-3way"])
def test_generate_pdf_shapes(name):
    spec = realsim.GMM_REAL[name]
    s, rs = spec.generate_pdf(0.02)
    kw = spec.scaled(0.02)
    assert len(s) == kw["n_s"]
    assert [len(r) for r in rs] == kw["n_rs"]
    assert len([c for c in s.columns if c.startswith("xs_")]) == spec.d_s
    for t, (r, d_r) in enumerate(zip(rs, spec.d_rs), start=1):
        assert list(r.columns) == ["rid", *r_feature_cols(d_r, t)]


def test_sparse_walmart_is_one_hot_both_sides():
    spec = realsim.NN_REAL["Walmart (Sparse)"]
    s, rs = spec.generate_pdf(0.01)
    assert set(np.unique(s[s_feature_cols(126)].to_numpy())) <= {0.0, 1.0}
    assert set(np.unique(rs[0][r_feature_cols(175, 1)].to_numpy())) <= {0.0, 1.0}
    assert "y" in s.columns


def test_sparse_movies_dense_s_side():
    spec = realsim.NN_REAL["Movies (Sparse)"]
    s, rs = spec.generate_pdf(0.01)
    # S carries the (dense) rating value; R is the one-hot movie encoding
    assert len(np.unique(s["xs_0"])) > 2
    assert set(np.unique(rs[0][r_feature_cols(21, 1)].to_numpy())) <= {0.0, 1.0}


def test_generation_deterministic():
    spec = realsim.GMM_REAL["Walmart (Not Sparse)"]
    s1, r1 = spec.generate_pdf(0.01)
    s2, r2 = spec.generate_pdf(0.01)
    np.testing.assert_array_equal(s1.to_numpy(), s2.to_numpy())
    np.testing.assert_array_equal(r1[0].to_numpy(), r2[0].to_numpy())
