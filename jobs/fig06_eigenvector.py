"""Reproduce Fig 6: eigenvector centrality top-k precision on enron_lite.

Usage: spark-submit jobs/fig06_eigenvector.py [--scale S] [--rhos ...] [--runs N]
"""
from _common import get_spark, print_results, std_parser
from repro.core import figures

if __name__ == "__main__":
    args = std_parser(__doc__).parse_args()
    spark = get_spark("fig06_eigenvector")
    kwargs = dict(scale=args.scale, rhos=args.rhos, n_runs=args.runs, seed=args.seed)
    if args.sparsifiers:
        kwargs["sparsifiers"] = args.sparsifiers
    results = figures.fig06_eigenvector(spark, **kwargs)
    print_results("Fig 6: eigenvector centrality top-k precision on enron_lite", results)
    spark.stop()
