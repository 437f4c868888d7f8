"""spark-submit entrypoint for T5 / Fig. 6(d): planner time vs budget (amazon_lite).

Runs the sweep with the EXPERIMENTS.md defaults (override via flags)
and prints the markdown table. See DESIGN.md §4 for the table index.
"""
import argparse
import sys

from repro.experiments import harness as H


def main(argv=None) -> int:
    ap = argparse.ArgumentParser(description='T5 / Fig. 6(d): planner time vs budget (amazon_lite)')
    ap.add_argument("--mc-eval", type=int, default=16)
    ap.add_argument("--max-pairs", type=int, default=100)
    args = ap.parse_args(argv)
    r = H.Runner(mc_eval=args.mc_eval, max_pairs=args.max_pairs)
    rows = H.table_t5_time_budget(r)
    print(H.to_markdown(rows))
    return 0


if __name__ == "__main__":
    sys.exit(main())
