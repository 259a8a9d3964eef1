"""NN over normalized data: M-NN, S-NN and F-NN (paper Section VI)."""
from repro.nn.f_nn import train_f_nn
from repro.nn.m_nn import train_m_nn
from repro.nn.s_nn import train_s_nn

__all__ = ["train_m_nn", "train_s_nn", "train_f_nn"]
