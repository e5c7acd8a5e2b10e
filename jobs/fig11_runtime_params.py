"""Reproduce paper Appendix Fig. 11: NRP running time vs alpha, eps, l1, l2.

    spark-submit jobs/fig11_runtime_params.py [--dataset wiki_lite]
"""
from _common import base_parser, finish
from repro.experiments.harness import param_sweep_table


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--dataset", default="wiki_lite")
    p.add_argument("--k", type=int, default=32)
    args = p.parse_args()
    df = param_sweep_table(args.dataset, k=args.k, seed=args.seed,
                           measure_time=True)
    finish(df, args)


if __name__ == "__main__":
    main()
