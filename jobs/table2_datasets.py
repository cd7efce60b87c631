"""Table II: dataset statistics (nodes, edges, S, T) of the synthetic
substitutes, next to the paper's original sizes.

    spark-submit jobs/table2_datasets.py [--sf 1.0]
"""
from repro.experiments.cli import print_df, table_arg_parser
from repro.experiments.tables import datasets_table

if __name__ == "__main__":
    args = table_arg_parser(__doc__).parse_args()
    print_df(datasets_table(sf=args.sf), "Table II — dataset statistics")
