"""T1a (paper Fig. 1a): preprocessing wall-clock per method per dataset.

The benchmarked operation is ``method.preprocess()`` on a fresh instance;
the timed instance is stored in the shared cache so later tables reuse it.
Paper-observed out-of-time combinations are skipped with the reason.
"""
import pytest

from repro.deadline import Deadline, OutOfTime
from repro.experiments.datasets import DATASET_ORDER

import bench_utils as bu


@pytest.mark.parametrize("dataset", DATASET_ORDER)
@pytest.mark.parametrize("method", bu.PREPROCESS_METHODS)
def test_preprocessing_time(benchmark, dataset, method):
    bu.skip_if_paper_oot(dataset, method)
    g, spec = bu.graph_and_spec(dataset)
    instance = bu.fresh_method(dataset, method)

    def run():
        try:
            instance.preprocess(Deadline(bu.BENCH_CAP))
        except OutOfTime:
            pytest.skip(f"{method} on {dataset}: exceeded {bu.BENCH_CAP}s")

    benchmark.pedantic(run, rounds=1, iterations=1)
    bu.store_prepped(dataset, method, instance)
    benchmark.extra_info.update(
        {
            "dataset": dataset,
            "method": method,
            "nodes": g.n,
            "edges": g.m,
            "preprocessed_bytes": instance.preprocessed_bytes,
        }
    )
