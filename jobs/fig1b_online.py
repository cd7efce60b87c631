"""Fig. 1(b) as a table: online wall-clock seconds per query per method.

    spark-submit jobs/fig1b_online.py [--sf 1.0 --seeds 5 --cap 60]
"""
from repro.experiments.cli import print_df, table_arg_parser
from repro.experiments.tables import online_table

if __name__ == "__main__":
    a = table_arg_parser(__doc__).parse_args()
    df = online_table(datasets=a.datasets, sf=a.sf, n_seeds=a.seeds, time_cap=a.cap)
    print_df(df, "Fig. 1(b) — online time per query [s]")
