"""T6 (paper Fig. 8): allocation running time per method.

Paper (η=2, full 91.8M-tx dataset): Shard Scheduler 3447.9 s,
METIS 422.7 s, G-TxAllo 122.3 s (67.6 s of it Louvain init); the
ordering random < G-TxAllo < METIS < Shard Scheduler is the claim.
"""
from static_tables import base_parser, print_t6, run_sweep

if __name__ == "__main__":
    ap = base_parser(__doc__)
    args = ap.parse_args()
    args.etas = args.etas[:1]  # Fig. 8 reports per-k times at a fixed η
    print_t6(run_sweep(args))
