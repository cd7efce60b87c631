"""T5 (paper Fig. 5): TPA vs TPA-NA accuracy — the stranger approximation
should lift Spearman sharply while changing L1 only slightly.

Benchmarks the TPA-NA query (the ablated online phase); both variants'
accuracies ride in ``extra_info``.
"""
import numpy as np
import pytest

from repro.experiments.datasets import DATASET_ORDER
from repro.metrics import l1_error, spearman

import bench_utils as bu


@pytest.mark.parametrize("dataset", DATASET_ORDER)
def test_stranger_effect(benchmark, dataset):
    tpa = bu.prepped(dataset, "TPA")
    exact = bu.exact_for(dataset)
    seeds = [int(s) for s in bu.seeds_for(dataset)]

    benchmark.pedantic(lambda: tpa.query_na(seeds[0]), rounds=1, iterations=1)

    info = {"dataset": dataset}
    for label, m in [("TPA", "TPA"), ("TPA-NA", "TPA-NA")]:
        rs = {s: bu.query_result(dataset, m, s) for s in seeds}
        info[f"{label}_L1"] = float(np.mean([l1_error(rs[s], exact[s]) for s in seeds]))
        info[f"{label}_rho"] = float(
            np.mean([spearman(rs[s], exact[s]) for s in seeds])
        )
    benchmark.extra_info.update(info)
    # the paper's headline: the stranger term rescues the ranking
    assert info["TPA_rho"] > info["TPA-NA_rho"]
