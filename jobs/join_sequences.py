"""Fig. 8 reproduction: sequences of joins, naive vs optimized —
(a) across machines, (b) total vs join-1 output size, (c) network
partitioning time/bytes vs output size, (d) vs number of joins.
All on the simulated MPI substrate, where per-phase network time and
bytes-on-the-wire are directly observable.

Run: python jobs/join_sequences.py
Env: REPRO_ROWS (default 2**17).
"""
import os

from repro.experiments import fig8a_machines, fig8bc_output_size, fig8d_num_joins, format_table


def main() -> None:
    n = int(os.environ.get("REPRO_ROWS", 1 << 17))
    print(format_table(fig8a_machines(n), f"Fig 8a — 2-join sequence vs machines ({n} rows/rel)"))
    print()
    print(format_table(fig8bc_output_size(n >> 1), "Fig 8b/8c — total & network time vs join-1 output"))
    print()
    print(format_table(fig8d_num_joins(n >> 1), "Fig 8d — naive vs optimized vs number of joins"))


if __name__ == "__main__":
    main()
