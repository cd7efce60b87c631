"""Benchmark-suite plumbing.

- makes ``bench_utils`` importable;
- knobs: ``BENCH_SF`` (dataset scale, default 1.0), ``BENCH_CAP`` (per-phase
  deadline seconds), ``BENCH_SEEDS`` (query seeds; paper used 30, default 3);
- a terminal-summary hook that prints every benchmark's ``extra_info`` as
  per-table DataFrames — this is what lands in ``bench_output.txt`` and what
  EXPERIMENTS.md quotes as the measured numbers.
"""
import os
import sys
from collections import defaultdict

sys.path.insert(0, os.path.dirname(__file__))


def pytest_terminal_summary(terminalreporter, exitstatus, config):
    bs = getattr(config, "_benchmarksession", None)
    if bs is None or not bs.benchmarks:
        return
    import pandas as pd

    groups = defaultdict(list)
    for bm in bs.benchmarks:
        row = dict(bm.extra_info)
        row["bench_mean_s"] = bm.stats.mean
        groups[bm.fullname.split("::")[0]].append(row)
    tr = terminalreporter
    tr.write_sep("=", "reproduction tables (benchmark extra_info)")
    with pd.option_context("display.width", 220, "display.max_columns", 50):
        for fname in sorted(groups):
            tr.write_line("")
            tr.write_sep("-", fname)
            df = pd.DataFrame(groups[fname])
            tr.write_line(df.to_string(float_format=lambda v: f"{v:.6g}"))
