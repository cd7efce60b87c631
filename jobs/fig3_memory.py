"""Fig. 3 as a table: preprocessed-data size (bytes) per method.

    spark-submit jobs/fig3_memory.py [--sf 1.0 --seeds 5 --cap 60]
"""
from repro.experiments.cli import print_df, table_arg_parser
from repro.experiments.tables import memory_table

if __name__ == "__main__":
    a = table_arg_parser(__doc__).parse_args()
    df = memory_table(datasets=a.datasets, sf=a.sf, n_seeds=a.seeds, time_cap=a.cap)
    print_df(df, "Fig. 3 — preprocessed data [bytes]")
