"""Reproduce paper Fig. 6: node classification micro/macro F1 vs train ratio.

    spark-submit jobs/fig6_node_classification.py
"""
from _common import base_parser, finish
from repro.experiments.harness import classification_table

DEFAULT_DATASETS = ["wiki_lite", "blogcatalog_lite", "youtube_lite", "tweibo_lite"]
DEFAULT_METHODS = ["nrp", "approxppr", "strap", "arope", "randne", "prone",
                   "netmf", "deepwalk", "line", "app", "verse", "gae"]


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--datasets", nargs="+", default=DEFAULT_DATASETS)
    p.add_argument("--methods", nargs="+", default=DEFAULT_METHODS)
    p.add_argument("--ratios", nargs="+", type=float,
                   default=[0.1, 0.3, 0.5, 0.7, 0.9])
    p.add_argument("--k", type=int, default=32)
    args = p.parse_args()
    df = classification_table(
        args.datasets, args.methods, args.ratios, k=args.k, seed=args.seed
    )
    finish(df, args)


if __name__ == "__main__":
    main()
