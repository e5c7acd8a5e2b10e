"""Reproduce paper Fig. 5: graph reconstruction precision@K.

    spark-submit jobs/fig5_graph_reconstruction.py
All pairs are scored on small graphs (distributed top-K scorer when a
SparkSession is up); larger graphs use the paper's 1%-of-pairs sample.
"""
from _common import base_parser, build_session, finish
from repro.experiments.harness import reconstruction_table

DEFAULT_DATASETS = ["wiki_lite", "blogcatalog_lite", "youtube_lite", "tweibo_lite"]
DEFAULT_METHODS = ["nrp", "approxppr", "strap", "arope", "randne", "prone",
                   "netmf", "deepwalk", "line", "app", "verse", "gae"]


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--datasets", nargs="+", default=DEFAULT_DATASETS)
    p.add_argument("--methods", nargs="+", default=DEFAULT_METHODS)
    p.add_argument("--Ks", nargs="+", type=int,
                   default=[10, 100, 1000, 10_000, 100_000])
    p.add_argument("--k", type=int, default=32)
    p.add_argument("--no-spark", action="store_true")
    args = p.parse_args()
    spark = None if args.no_spark else build_session("fig5-reconstruction")
    df = reconstruction_table(
        args.datasets, args.methods, args.Ks, k=args.k, seed=args.seed,
        spark=spark,
    )
    finish(df, args)
    if spark:
        spark.stop()


if __name__ == "__main__":
    main()
