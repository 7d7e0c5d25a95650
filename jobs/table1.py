"""spark-submit entrypoint: regenerate the paper's Table 1 (Query 1
over all 14 graphs, four implementation columns) and print both the
paper-style table and the paper-vs-measured markdown comparison.

Usage::

    spark-submit jobs/table1.py [--graphs skos,wine,...]
"""
import argparse
import sys

from pyspark.sql import SparkSession

from repro.bench.harness import format_comparison, format_table, run_table
from repro.bench.paper_numbers import PAPER_TABLE1
from repro.cfg.queries import query1
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

    spark = SparkSession.builder.appName("cfpq-table1").getOrCreate()
    try:
        rows = run_table(query1(), spark=spark, graph_names=names)
        print(format_table(rows, title="Table 1: Evaluation results for Query 1"))
        print()
        print(format_comparison(rows, PAPER_TABLE1, title="Table 1 (paper / here)"))
        return 0
    finally:
        spark.stop()


if __name__ == "__main__":
    sys.exit(main())
