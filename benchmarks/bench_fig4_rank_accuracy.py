"""T4 (paper Fig. 4): Spearman rank correlation vs exact RWR per method.

Rank-accuracy numbers ride in ``extra_info``; the benchmarked operation is
the Spearman computation over cached query results.
"""
import numpy as np
import pytest

from repro.experiments.datasets import DATASET_ORDER
from repro.metrics import spearman

import bench_utils as bu


@pytest.mark.parametrize("dataset", DATASET_ORDER)
@pytest.mark.parametrize("method", bu.ONLINE_METHODS)
def test_rank_accuracy(benchmark, dataset, method):
    if method == "HubPPR":
        bu.hubppr_online_allowed(dataset)
    exact = bu.exact_for(dataset)
    seeds = [int(s) for s in bu.seeds_for(dataset)]
    if method == "HubPPR":
        seeds = seeds[:1]
    results = {s: bu.query_result(dataset, method, s) for s in seeds}

    def run():
        return float(np.mean([spearman(results[s], exact[s]) for s in seeds]))

    rho = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info.update(
        {"dataset": dataset, "method": method, "mean_spearman": rho}
    )
