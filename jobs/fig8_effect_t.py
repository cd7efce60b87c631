"""Fig. 8 as a table: sweep T (S fixed at 4) — L1 error dips then rebounds;
Spearman stays high for any finite T.

    spark-submit jobs/fig8_effect_t.py [--sf 1.0 --seeds 5]
"""
from repro.experiments.cli import print_df, table_arg_parser
from repro.experiments.tables import effect_of_T_table

if __name__ == "__main__":
    a = table_arg_parser(__doc__).parse_args()
    ds = a.datasets or ("livejournal-lite", "pokec-lite")
    print_df(effect_of_T_table(ds, sf=a.sf, n_seeds=a.seeds), "Fig. 8 — effect of T")
