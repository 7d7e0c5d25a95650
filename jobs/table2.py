"""spark-submit entrypoint: regenerate the paper's Table 2 (Query 2
over all 14 graphs, four implementation columns) and print both the
paper-style table and the paper-vs-measured markdown comparison.

Usage::

    spark-submit jobs/table2.py [--graphs skos,wine,...]
"""
import argparse
import sys

from pyspark.sql import SparkSession

from repro.bench.harness import format_comparison, format_table, run_table
from repro.bench.paper_numbers import PAPER_TABLE2
from repro.cfg.queries import query2
from repro.graphs.ontology import GRAPH_NAMES


def main(argv=None) -> int:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument(
        "--graphs",
        default=",".join(GRAPH_NAMES),
        help="comma-separated subset of graph names",
    )
    args = ap.parse_args(argv)
    names = tuple(args.graphs.split(","))

    spark = SparkSession.builder.appName("cfpq-table2").getOrCreate()
    try:
        rows = run_table(query2(), spark=spark, graph_names=names)
        print(format_table(rows, title="Table 2: Evaluation results for Query 2"))
        print()
        print(format_comparison(rows, PAPER_TABLE2, title="Table 2 (paper / here)"))
        return 0
    finally:
        spark.stop()


if __name__ == "__main__":
    sys.exit(main())
