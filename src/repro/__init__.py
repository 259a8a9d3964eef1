"""Reproduction of "Nonlinear Models over Normalized Data" (ICDE 2019).

Factorized training of Gaussian Mixture Models and Neural Networks over
normalized relations in PySpark: ``repro.gmm`` and ``repro.nn`` hold the
M/S/F algorithm trio for each model, ``repro.core`` the shared numerical
machinery, ``repro.data`` the dataset generators, and ``repro.bench`` the
evaluation harness. See DESIGN.md at the repo root.
"""
