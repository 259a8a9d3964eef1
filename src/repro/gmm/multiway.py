"""Multi-way join GMM trainers (paper Section V-C).

The binary trainers in this package are implemented directly over the general
q-way formulation (Eq. 19-24) — a binary join is the q=1 special case, in
which the pair cross-terms vanish. This module exposes explicitly named
aliases for callers that work with ``S, [R1..Rq]``; passing a list of
dimension DataFrames to any trainer runs the multi-way algorithm.
"""
from repro.gmm.f_gmm import train_f_gmm as train_f_gmm_multiway
from repro.gmm.m_gmm import train_m_gmm as train_m_gmm_multiway
from repro.gmm.s_gmm import train_s_gmm as train_s_gmm_multiway

__all__ = [
    "train_m_gmm_multiway",
    "train_s_gmm_multiway",
    "train_f_gmm_multiway",
]
