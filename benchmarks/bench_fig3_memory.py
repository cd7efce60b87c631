"""T3 (paper Fig. 3): preprocessed-data size per method per dataset.

The byte counts ride in ``extra_info``; the benchmarked operation is the
accounting itself over the cached preprocessed instance. Methods without a
preprocessing phase (RPPR/BRPPR) have no rows, matching the missing bars.
"""
import pytest

from repro.experiments.datasets import DATASET_ORDER

import bench_utils as bu


@pytest.mark.parametrize("dataset", DATASET_ORDER)
@pytest.mark.parametrize("method", bu.PREPROCESS_METHODS)
def test_preprocessed_bytes(benchmark, dataset, method):
    instance = bu.prepped(dataset, method)
    g, _ = bu.graph_and_spec(dataset)

    nbytes = benchmark.pedantic(
        lambda: instance.preprocessed_bytes, rounds=1, iterations=1
    )
    assert nbytes > 0
    benchmark.extra_info.update(
        {
            "dataset": dataset,
            "method": method,
            "preprocessed_bytes": nbytes,
            "bytes_per_node": nbytes / g.n,
        }
    )
