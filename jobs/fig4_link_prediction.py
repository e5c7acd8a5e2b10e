"""Reproduce paper Fig. 4: link-prediction AUC vs embedding dimension.

    spark-submit jobs/fig4_link_prediction.py [--datasets ...] [--ks 16 32 64]
NRP runs its distributed (Spark) ApproxPPR phase on the first dataset to
exercise the dataflow path; other methods run on the local backend.
"""
from _common import base_parser, build_session, finish
from repro.experiments.harness import link_prediction_table

DEFAULT_DATASETS = ["wiki_lite", "blogcatalog_lite", "youtube_lite",
                    "tweibo_lite", "orkut_lite"]
DEFAULT_METHODS = ["nrp", "approxppr", "strap", "arope", "randne", "prone",
                   "netmf", "deepwalk", "line", "app", "verse", "gae"]


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--datasets", nargs="+", default=DEFAULT_DATASETS)
    p.add_argument("--methods", nargs="+", default=DEFAULT_METHODS)
    p.add_argument("--ks", nargs="+", type=int, default=[16, 32, 64])
    p.add_argument("--no-spark", action="store_true")
    args = p.parse_args()
    spark = None if args.no_spark else build_session("fig4-linkpred")
    df = link_prediction_table(
        args.datasets, args.methods, args.ks, seed=args.seed,
        spark=spark, spark_methods=("nrp",) if spark else (),
    )
    finish(df, args)
    if spark:
        spark.stop()


if __name__ == "__main__":
    main()
