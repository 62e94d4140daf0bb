"""Reproduce Fig 1: graph connectivity (unreachable/isolated ratio) on astroph_lite.

Usage: spark-submit jobs/fig01_connectivity.py [--scale S] [--rhos ...] [--runs N]
"""
from _common import get_spark, print_results, std_parser
from repro.core import figures

if __name__ == "__main__":
    args = std_parser(__doc__).parse_args()
    spark = get_spark("fig01_connectivity")
    kwargs = dict(scale=args.scale, rhos=args.rhos, n_runs=args.runs, seed=args.seed)
    if args.sparsifiers:
        kwargs["sparsifiers"] = args.sparsifiers
    results = figures.fig01_connectivity(spark, **kwargs)
    print_results("Fig 1: graph connectivity (unreachable/isolated ratio) on astroph_lite", results)
    spark.stop()
