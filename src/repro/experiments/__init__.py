"""Experiment harnesses — one module per evaluation table (Tables 2–5) plus
the figure-shaped sweeps (Figs. 5–7) whose curves Table 4 and the ScaNN
speedup claim are read from. Each module exposes ``run(...) -> pd.DataFrame``
and a ``markdown(...)`` formatter used by jobs/ and EXPERIMENTS.md."""
