"""Fig. 7 as a table: sweep S (T fixed at 10) — online time rises with S
while L1 error falls (the accuracy/speed trade-off).

    spark-submit jobs/fig7_effect_s.py [--sf 1.0 --seeds 5]
"""
from repro.experiments.cli import print_df, table_arg_parser
from repro.experiments.tables import effect_of_S_table

if __name__ == "__main__":
    a = table_arg_parser(__doc__).parse_args()
    ds = a.datasets or ("livejournal-lite", "pokec-lite")
    print_df(effect_of_S_table(ds, sf=a.sf, n_seeds=a.seeds), "Fig. 7 — effect of S")
