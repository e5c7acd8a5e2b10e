"""Reproduce paper Fig. 7: embedding construction time vs k.

    spark-submit jobs/fig7_efficiency.py
Includes the billion-edge stand-ins (twitter_lite, friendster_lite), on
which only the scalable methods run — the scale caps mirror the paper's
7-day cutoff.
"""
from _common import base_parser, finish
from repro.experiments.harness import efficiency_table

DEFAULT_DATASETS = ["wiki_lite", "blogcatalog_lite", "youtube_lite",
                    "tweibo_lite", "orkut_lite", "twitter_lite",
                    "friendster_lite"]
DEFAULT_METHODS = ["nrp", "approxppr", "strap", "arope", "randne", "prone",
                   "netmf", "deepwalk", "line", "app", "verse", "gae"]


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--datasets", nargs="+", default=DEFAULT_DATASETS)
    p.add_argument("--methods", nargs="+", default=DEFAULT_METHODS)
    p.add_argument("--ks", nargs="+", type=int, default=[16, 32, 64])
    args = p.parse_args()
    df = efficiency_table(args.datasets, args.methods, args.ks, seed=args.seed)
    finish(df, args)


if __name__ == "__main__":
    main()
