"""Reproduce Fig 14: sparsification time on proteins_lite.

Usage: spark-submit jobs/fig14_sparsification_time.py [--scale S] [--rhos ...] [--runs N]
"""
from _common import get_spark, print_results, std_parser
from repro.core import figures

if __name__ == "__main__":
    args = std_parser(__doc__).parse_args()
    spark = get_spark("fig14_sparsification_time")
    kwargs = dict(scale=args.scale, rhos=args.rhos, n_runs=args.runs, seed=args.seed)
    if args.sparsifiers:
        kwargs["sparsifiers"] = args.sparsifiers
    results = figures.fig14_sparsification_time(spark, **kwargs)
    print_results("Fig 14: sparsification time on proteins_lite", results)
    spark.stop()
