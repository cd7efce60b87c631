"""T1b (paper Fig. 1b): online wall-clock per query per method per dataset.

Benchmarks one full-vector query from a preprocessed (cached) instance,
cycling through the bench seeds across rounds. HubPPR's online phase only
runs on the smallest dataset, as in the paper. The query results are cached
for the accuracy tables (T1c, T4).
"""
import itertools

import pytest

from repro.deadline import Deadline, OutOfTime
from repro.experiments.datasets import DATASET_ORDER

import bench_utils as bu


@pytest.mark.parametrize("dataset", DATASET_ORDER)
@pytest.mark.parametrize("method", bu.ONLINE_METHODS)
def test_online_time(benchmark, dataset, method):
    if method == "HubPPR":
        bu.hubppr_online_allowed(dataset)
    instance = bu.prepped(dataset, method)
    seeds = bu.seeds_for(dataset)
    cycle = itertools.cycle(int(s) for s in seeds)
    fn = instance.query_na if method == "TPA-NA" else instance.query

    def run():
        s = next(cycle)
        try:
            r = fn(s, Deadline(bu.BENCH_CAP))
        except OutOfTime:
            pytest.skip(f"{method} on {dataset}: online exceeded {bu.BENCH_CAP}s")
        bu._results[(dataset, method, s)] = r

    rounds = 1 if method == "HubPPR" else len(seeds)
    benchmark.pedantic(run, rounds=rounds, iterations=1)
    benchmark.extra_info.update({"dataset": dataset, "method": method})
