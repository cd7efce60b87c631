"""Shared state for the benchmark suite.

Graphs, exact vectors, preprocessed method instances, and query results are
cached at module scope so the per-table bench files (which pytest runs in
filename order: fig1a → fig1b → fig1c → fig3 → …) measure their own
operation exactly once and reuse everything else. The paper's out-of-time
omissions are reproduced as pytest skips with the reason attached.
"""
from __future__ import annotations

import os

import numpy as np
import pytest

from repro.core.local_cpi import exact_rwr
from repro.deadline import Deadline, OutOfTime
from repro.experiments.datasets import er_twin, load_local
from repro.experiments.runner import EXPECTED_OOT, build_method, pick_seeds

BENCH_SF = float(os.environ.get("BENCH_SF", "1.0"))
BENCH_CAP = float(os.environ.get("BENCH_CAP", "120"))
N_SEEDS = int(os.environ.get("BENCH_SEEDS", "3"))

# Paper Fig. 1(b): HubPPR's full-vector online phase is ~10⁴× slower than
# TPA and is only reported on the smallest graph.
HUBPPR_ONLINE_OK = {"slashdot-lite"}

PREPROCESS_METHODS = ["TPA", "NB-LIN", "BEAR-APPROX", "HubPPR"]
ONLINE_METHODS = ["TPA", "TPA-NA", "RPPR", "BRPPR", "NB-LIN", "BEAR-APPROX", "HubPPR"]

_prep: dict = {}
_exact: dict = {}
_results: dict = {}


def graph_and_spec(name: str):
    return load_local(name, BENCH_SF)


def seeds_for(name: str) -> np.ndarray:
    g, _ = graph_and_spec(name)
    return pick_seeds(g, N_SEEDS)


def exact_for(name: str) -> dict[int, np.ndarray]:
    if name not in _exact:
        g, _ = graph_and_spec(name)
        _exact[name] = {int(s): exact_rwr(g, int(s)) for s in seeds_for(name)}
    return _exact[name]


def skip_if_paper_oot(name: str, method: str) -> None:
    """Skip (dataset, method) pairs whose preprocessing timed out in the
    paper; HubPPR's online-only omissions use ``hubppr_online_allowed``."""
    base = "TPA" if method == "TPA-NA" else method
    if name in EXPECTED_OOT.get(base, set()):
        pytest.skip(f"{method} on {name}: out-of-time in the paper (bar omitted)")


def fresh_method(name: str, method: str):
    g, spec = graph_and_spec(name)
    return build_method("TPA" if method == "TPA-NA" else method, g, spec)


def prepped(name: str, method: str):
    """Preprocessed method instance (cached); skips on paper/actual OOT."""
    base = "TPA" if method == "TPA-NA" else method
    key = (name, base)
    if key in _prep:
        return _prep[key]
    skip_if_paper_oot(name, base)
    m = fresh_method(name, base)
    try:
        m.preprocess(Deadline(BENCH_CAP))
    except OutOfTime:
        pytest.skip(f"{base} on {name}: preprocessing exceeded {BENCH_CAP}s")
    _prep[key] = m
    return m


def store_prepped(name: str, method: str, instance) -> None:
    _prep[(name, method)] = instance


def query_result(name: str, method: str, seed: int) -> np.ndarray:
    """One query result per (dataset, method, seed), cached across tables."""
    key = (name, method, int(seed))
    if key not in _results:
        m = prepped(name, method)
        fn = m.query_na if method == "TPA-NA" else m.query
        try:
            _results[key] = fn(int(seed), Deadline(BENCH_CAP))
        except OutOfTime:
            pytest.skip(f"{method} on {name}: online phase exceeded {BENCH_CAP}s")
    return _results[key]


def hubppr_online_allowed(name: str) -> None:
    if name not in HUBPPR_ONLINE_OK:
        pytest.skip(
            f"HubPPR online on {name}: ~10^4x slower than TPA in the paper "
            "(bar omitted from Google on)"
        )


def twin_graph(name: str):
    return er_twin(name, BENCH_SF)
