"""Run every table/experiment job in sequence and print all tables.

This is the script that regenerates the "ours" columns of
EXPERIMENTS.md end to end.
"""
import _common
import exp1_small_omega
import exp2_large_omega
import exp3_ablation
import exp4_orderings
import exp5_rule2
import exp6_et_t
import exp7_parallel
import exp8_space
import exp9_scalability
import table1_stats
import table2_ordering


def main() -> None:
    table1_stats.main()
    table2_ordering.main()
    exp1_small_omega.main()
    exp2_large_omega.main()
    exp3_ablation.main()
    exp4_orderings.main()
    exp5_rule2.main()
    exp6_et_t.main()
    exp8_space.main()
    exp7_parallel.main()
    exp9_scalability.main()


if __name__ == "__main__":
    main()
