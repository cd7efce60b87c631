"""Shared CLI plumbing for the ``jobs/`` spark-submit entrypoints.

Each job reproduces one table of the evaluation (DESIGN.md §5): it parses
``--sf/--seeds/--cap``, builds the table via ``repro.experiments.tables``,
and prints it. Jobs that need Spark build their own session (they run under
``spark-submit``); the pytest suite uses the shared ``spark`` fixture
instead.
"""
from __future__ import annotations

import argparse

import pandas as pd

__all__ = ["table_arg_parser", "print_df"]


def table_arg_parser(description: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=description)
    p.add_argument("--sf", type=float, default=1.0, help="dataset scale factor")
    p.add_argument("--seeds", type=int, default=5, help="number of random seed nodes")
    p.add_argument("--cap", type=float, default=60.0, help="per-phase deadline seconds")
    p.add_argument(
        "--datasets", nargs="*", default=None, help="subset of dataset names"
    )
    return p


def print_df(df: pd.DataFrame, title: str) -> None:
    print(f"\n=== {title} ===")
    with pd.option_context("display.width", 200, "display.max_columns", 50):
        print(df.to_string(float_format=lambda v: f"{v:.6g}"))
