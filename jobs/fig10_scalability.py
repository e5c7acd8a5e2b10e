"""Reproduce paper Appendix Fig. 10: NRP runtime on Erdos-Renyi graphs,
varying n at fixed m and m at fixed n (paper scale / 10).

    spark-submit jobs/fig10_scalability.py [--backend spark]
"""
from _common import base_parser, build_session, finish
from repro.experiments.harness import scalability_table


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--backend", choices=["local", "spark"], default="local")
    p.add_argument("--k", type=int, default=32)
    args = p.parse_args()
    spark = build_session("fig10-scalability") if args.backend == "spark" else None
    df = scalability_table(spark, k=args.k, seed=args.seed, backend=args.backend)
    finish(df, args)
    if spark:
        spark.stop()


if __name__ == "__main__":
    main()
