"""PySpark reproduction of "Unsupervised Space Partitioning for Nearest
Neighbor Search" (Fahim, Ali, Cheema — EDBT 2023).

Subpackages: ``core`` (the paper's contribution), ``nn``/``knn``/``index``
(substrates), ``baselines``/``scann``/``cluster`` (everything the paper
compares against), ``experiments`` (Tables 2–5 + Figs. 5–7 harnesses).
See DESIGN.md and EXPERIMENTS.md at the repository root.
"""
