"""Fig. 4 as a table: Spearman rank correlation vs exact RWR per method.

    spark-submit jobs/fig4_rank_accuracy.py [--sf 1.0 --seeds 5 --cap 60]
"""
from repro.experiments.cli import print_df, table_arg_parser
from repro.experiments.tables import accuracy_table

if __name__ == "__main__":
    a = table_arg_parser(__doc__).parse_args()
    df = accuracy_table(datasets=a.datasets, sf=a.sf, n_seeds=a.seeds, time_cap=a.cap)
    print_df(df[[c for c in df.columns if c.endswith(" rho")]], "Fig. 4 — Spearman correlation")
