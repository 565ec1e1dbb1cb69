#!/usr/bin/env python
"""Reproduce paper Table I: relationship-type ratios in user surveys.

Runs the survey simulator over the planted-circle network and prints
first/second-category ratios next to the paper's.

    python jobs/table1_survey.py [--n-nodes 3000] [--seed 7]
"""
from _common import arg_parser, emit


def main():
    ap = arg_parser("Table I: survey relationship-type ratios")
    ap.add_argument("--n-surveyed", type=int, default=400)
    args = ap.parse_args()

    from repro.core.tables import table1

    tab = table1(n_nodes=args.n_nodes, seed=args.seed, n_surveyed=args.n_surveyed)
    emit(tab.round(4), "table1", args.out)


if __name__ == "__main__":
    main()
