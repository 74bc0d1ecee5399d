"""T2 (paper Fig. 3): workload balance ρ/λ per method/k/η.

Paper shape: Shard Scheduler best; G-TxAllo beats the graph baselines.
"""
from static_tables import base_parser, print_t2, run_sweep

if __name__ == "__main__":
    args = base_parser(__doc__).parse_args()
    print_t2(run_sweep(args))
