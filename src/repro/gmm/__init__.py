"""GMM over normalized data: M-GMM, S-GMM and F-GMM (paper Section V)."""
from repro.gmm.f_gmm import train_f_gmm
from repro.gmm.m_gmm import train_m_gmm
from repro.gmm.s_gmm import train_s_gmm

__all__ = ["train_m_gmm", "train_s_gmm", "train_f_gmm"]
