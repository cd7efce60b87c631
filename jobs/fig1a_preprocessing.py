"""Fig. 1(a) as a table: preprocessing wall-clock seconds per method per
dataset (NaN = no preprocessing phase or out-of-time, as in the paper).

    spark-submit jobs/fig1a_preprocessing.py [--sf 1.0 --seeds 5 --cap 60]
"""
from repro.experiments.cli import print_df, table_arg_parser
from repro.experiments.tables import preprocessing_table

if __name__ == "__main__":
    a = table_arg_parser(__doc__).parse_args()
    df = preprocessing_table(datasets=a.datasets, sf=a.sf, n_seeds=a.seeds, time_cap=a.cap)
    print_df(df, "Fig. 1(a) — preprocessing time [s]")
