"""Multi-way join NN trainers (paper Section VI-B).

As with the GMM package, the binary trainers are implemented over the general
q-way formulation (Eq. 30-32); a binary join is q=1. These aliases make the
multi-way entry points explicit for callers holding ``S, [R1..Rq]``.
"""
from repro.nn.f_nn import train_f_nn as train_f_nn_multiway
from repro.nn.m_nn import train_m_nn as train_m_nn_multiway
from repro.nn.s_nn import train_s_nn as train_s_nn_multiway

__all__ = ["train_m_nn_multiway", "train_s_nn_multiway", "train_f_nn_multiway"]
