"""T1c (paper Fig. 1c): L1 norm error vs exact RWR per method per dataset.

Accuracy numbers ride in ``extra_info`` (the table's payload); the
benchmarked operation is the metric computation over cached query results.
"""
import numpy as np
import pytest

from repro.experiments.datasets import DATASET_ORDER
from repro.metrics import l1_error

import bench_utils as bu


@pytest.mark.parametrize("dataset", DATASET_ORDER)
@pytest.mark.parametrize("method", bu.ONLINE_METHODS)
def test_l1_error(benchmark, dataset, method):
    if method == "HubPPR":
        bu.hubppr_online_allowed(dataset)
    exact = bu.exact_for(dataset)
    seeds = [int(s) for s in bu.seeds_for(dataset)]
    if method == "HubPPR":
        seeds = seeds[:1]
    results = {s: bu.query_result(dataset, method, s) for s in seeds}

    def run():
        return float(np.mean([l1_error(results[s], exact[s]) for s in seeds]))

    mean_l1 = benchmark.pedantic(run, rounds=1, iterations=1)
    per_seed = {s: l1_error(results[s], exact[s]) for s in seeds}
    benchmark.extra_info.update(
        {
            "dataset": dataset,
            "method": method,
            "mean_L1": mean_l1,
            "std_L1": float(np.std(list(per_seed.values()))),
        }
    )
