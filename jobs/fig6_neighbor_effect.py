"""Fig. 6 as a table: TPA-NA on block-structured (DCSBM) vs random (ER)
graphs — the neighbor approximation should show lower L1 error on the
structured graph.

    spark-submit jobs/fig6_neighbor_effect.py [--sf 1.0 --seeds 5]
"""
from repro.experiments.cli import print_df, table_arg_parser
from repro.experiments.tables import neighbor_effect_table

if __name__ == "__main__":
    a = table_arg_parser(__doc__).parse_args()
    print_df(
        neighbor_effect_table(datasets=a.datasets, sf=a.sf, n_seeds=a.seeds),
        "Fig. 6 — neighbor approximation on real-like vs random graphs",
    )
