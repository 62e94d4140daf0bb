"""Reproduce Fig 4: SPSP/eccentricity stretch (astroph_lite) and diameter (facebook_lite).

Usage: spark-submit jobs/fig04_distance.py [--scale S] [--rhos ...] [--runs N]
"""
from _common import get_spark, print_results, std_parser
from repro.core import figures

if __name__ == "__main__":
    args = std_parser(__doc__).parse_args()
    spark = get_spark("fig04_distance")
    kwargs = dict(scale=args.scale, rhos=args.rhos, n_runs=args.runs, seed=args.seed)
    if args.sparsifiers:
        kwargs["sparsifiers"] = args.sparsifiers
    results = figures.fig04_distance(spark, **kwargs)
    print_results("Fig 4: SPSP/eccentricity stretch (astroph_lite) and diameter (facebook_lite)", results)
    spark.stop()
