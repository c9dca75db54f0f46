"""One module per evaluation table of the paper (Tables II–XI).

Each module exposes ``run(...) -> pd.DataFrame`` producing the same rows the
paper reports, plus a ``PAPER`` constant with the published numbers so
EXPERIMENTS.md / the benchmarks can print both side by side.
"""
