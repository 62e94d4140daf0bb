"""Reproduce Fig 2: degree-distribution Bhattacharyya distance on proteins_lite.

Usage: spark-submit jobs/fig02_degree_distribution.py [--scale S] [--rhos ...] [--runs N]
"""
from _common import get_spark, print_results, std_parser
from repro.core import figures

if __name__ == "__main__":
    args = std_parser(__doc__).parse_args()
    spark = get_spark("fig02_degree_distribution")
    kwargs = dict(scale=args.scale, rhos=args.rhos, n_runs=args.runs, seed=args.seed)
    if args.sparsifiers:
        kwargs["sparsifiers"] = args.sparsifiers
    results = figures.fig02_degree_distribution(spark, **kwargs)
    print_results("Fig 2: degree-distribution Bhattacharyya distance on proteins_lite", results)
    spark.stop()
