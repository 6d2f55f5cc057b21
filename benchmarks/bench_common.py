"""Shared benchmark plumbing.

Each ``bench_*`` file regenerates one paper exhibit at benchmark scale
(SF~0.1-equivalent; the jobs/ entrypoints run the full scale used in
EXPERIMENTS.md). The result table is printed into the benchmark output
so ``bench_output.txt`` carries the reproduced numbers, and the timed
function is run once (``rounds=1``) — these are minutes-scale
experiments, not microbenchmarks.
"""
import pandas as pd


def show(title: str, pdf: pd.DataFrame) -> pd.DataFrame:
    print(f"\n== {title} ==")
    print(pdf.to_string(index=False))
    return pdf


def once(benchmark, fn):
    """Run ``fn`` exactly once under pytest-benchmark timing."""
    return benchmark.pedantic(fn, rounds=1, iterations=1, warmup_rounds=0)
