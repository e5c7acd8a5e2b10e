"""Reproduce paper Appendix Fig. 9: link prediction on evolving graphs
(embed the old snapshot, predict the genuinely-new edges).

    spark-submit jobs/fig9_evolving.py
"""
from _common import base_parser, finish
from repro.experiments.harness import evolving_table

DEFAULT_METHODS = ["nrp", "approxppr", "strap", "arope", "randne", "prone",
                   "deepwalk", "line", "app", "verse"]


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--datasets", nargs="+", default=["vk_lite", "digg_lite"])
    p.add_argument("--methods", nargs="+", default=DEFAULT_METHODS)
    p.add_argument("--k", type=int, default=32)
    args = p.parse_args()
    df = evolving_table(args.datasets, args.methods, k=args.k, seed=args.seed)
    finish(df, args)


if __name__ == "__main__":
    main()
