#!/usr/bin/env python
"""Reproduce paper Table II: group-name rule-mining precision/recall/F1.

    python jobs/table2_groupnames.py [--n-nodes 3000] [--seed 7]
"""
from _common import arg_parser, emit


def main():
    args = arg_parser("Table II: group-name classification").parse_args()

    from repro.core.tables import table2

    tab = table2(n_nodes=args.n_nodes, seed=args.seed)
    emit(tab.round(4), "table2", args.out)


if __name__ == "__main__":
    main()
