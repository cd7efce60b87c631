"""T2 (paper Table II): the synthetic substitutes — generation cost plus
their measured statistics (nodes, edges, S, T) in ``extra_info``, next to
the paper graphs' sizes for the scale-down factor.
"""
import pytest

from repro.experiments.datasets import DATASET_ORDER, DATASETS, load_local, scaled
from repro.graph.generators import dcsbm

import bench_utils as bu


@pytest.mark.parametrize("dataset", DATASET_ORDER)
def test_dataset_generation(benchmark, dataset):
    spec = scaled(DATASETS[dataset], bu.BENCH_SF)

    def gen():
        return dcsbm(
            spec.n,
            spec.m,
            n_blocks=spec.n_blocks,
            p_in=spec.p_in,
            alpha_out=spec.alpha_out,
            alpha_in=spec.alpha_in,
            seed=spec.seed,
        )

    n, src, dst, _ = benchmark.pedantic(gen, rounds=1, iterations=1)
    g, _ = load_local(dataset, bu.BENCH_SF)  # warm the shared cache
    paper = DATASETS[dataset]
    benchmark.extra_info.update(
        {
            "dataset": dataset,
            "nodes": g.n,
            "edges": g.m,
            "S": spec.S,
            "T": spec.T,
            "paper_nodes": paper.paper_n,
            "paper_edges": paper.paper_m,
            "scale_factor": round(paper.paper_n / g.n, 1),
        }
    )
