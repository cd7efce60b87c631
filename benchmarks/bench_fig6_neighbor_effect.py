"""T6 (paper Fig. 6): TPA-NA accuracy on block-structured (DCSBM) graphs vs
their same-size Erdős–Rényi twins — the neighbor approximation's L1 error
should be lower on the structured graph (and its rank accuracy lower, since
block structure traps the estimate inside the seed's community).

Benchmarks the TPA preprocessing on the ER twin (the extra work this table
requires); both graphs' accuracies ride in ``extra_info``.
"""
import numpy as np
import pytest

from repro.core.local_cpi import exact_rwr
from repro.core.local_tpa import LocalTPA
from repro.experiments.datasets import DATASET_ORDER
from repro.experiments.runner import C, EPS, pick_seeds
from repro.metrics import l1_error, spearman

import bench_utils as bu


@pytest.mark.parametrize("dataset", DATASET_ORDER)
def test_neighbor_effect(benchmark, dataset):
    g, spec = bu.graph_and_spec(dataset)
    twin = bu.twin_graph(dataset)
    twin_tpa = LocalTPA(twin, c=C, S=spec.S, T=spec.T, eps=EPS)

    benchmark.pedantic(twin_tpa.preprocess, rounds=1, iterations=1)

    info = {"dataset": dataset}
    # structured graph: reuse the shared caches
    real_tpa = bu.prepped(dataset, "TPA")
    seeds = [int(s) for s in bu.seeds_for(dataset)]
    exact = bu.exact_for(dataset)
    info["real_L1"] = float(
        np.mean([l1_error(real_tpa.query_na(s), exact[s]) for s in seeds])
    )
    info["real_rho"] = float(
        np.mean([spearman(real_tpa.query_na(s), exact[s]) for s in seeds])
    )
    # random twin
    tseeds = [int(s) for s in pick_seeds(twin, bu.N_SEEDS)]
    texact = {s: exact_rwr(twin, s) for s in tseeds}
    info["random_L1"] = float(
        np.mean([l1_error(twin_tpa.query_na(s), texact[s]) for s in tseeds])
    )
    info["random_rho"] = float(
        np.mean([spearman(twin_tpa.query_na(s), texact[s]) for s in tseeds])
    )
    benchmark.extra_info.update(info)
