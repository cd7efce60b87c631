"""Fig. 5 as a table: TPA vs TPA-NA accuracy — value of the stranger
approximation (it should lift Spearman sharply, L1 slightly).

    spark-submit jobs/fig5_stranger_effect.py [--sf 1.0 --seeds 5]
"""
from repro.experiments.cli import print_df, table_arg_parser
from repro.experiments.tables import stranger_effect_table

if __name__ == "__main__":
    a = table_arg_parser(__doc__).parse_args()
    print_df(
        stranger_effect_table(datasets=a.datasets, sf=a.sf, n_seeds=a.seeds),
        "Fig. 5 — stranger approximation ablation",
    )
