"""T1 (paper Fig. 2): cross-shard transaction ratio γ per method/k/η.

Paper headline (k=60): random 98%, METIS 28%, G-TxAllo 12%.
"""
from static_tables import base_parser, print_t1, run_sweep

if __name__ == "__main__":
    args = base_parser(__doc__).parse_args()
    print_t1(run_sweep(args))
