"""spark-submit entrypoint: evaluate one paper query on one graph.

Usage::

    spark-submit jobs/run_query.py [--query 1|2] [--graph wine]
                                   [--engine spark|spark-block|csr|...]

Prints |R_S| and the first rows of the result relation.
"""
import argparse
import sys

from pyspark.sql import SparkSession

from repro.cfg.queries import query1, query2
from repro.core.api import ENGINES, graph_parse
from repro.graphs.ontology import GRAPH_NAMES, query_graph


def main(argv=None) -> int:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--query", type=int, choices=(1, 2), default=1)
    ap.add_argument("--graph", choices=GRAPH_NAMES, default="skos")
    ap.add_argument("--engine", choices=ENGINES, default="spark")
    args = ap.parse_args(argv)

    spark = SparkSession.builder.appName(
        f"cfpq-q{args.query}-{args.graph}"
    ).getOrCreate()
    try:
        grammar = query1() if args.query == 1 else query2()
        graph = query_graph(args.graph)
        relations = graph_parse(
            graph, grammar, engine=args.engine, spark=spark
        )
        rel = sorted(relations["S"])
        print(
            f"graph={args.graph} query={args.query} engine={args.engine} "
            f"#results={len(rel)}"
        )
        for pair in rel[:20]:
            print(pair)
        return 0
    finally:
        spark.stop()


if __name__ == "__main__":
    sys.exit(main())
