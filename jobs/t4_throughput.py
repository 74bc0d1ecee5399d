"""T4 (paper Fig. 5): normalized throughput Λ/λ per method/k/η.

Paper headline (η=2, k=60): G-TxAllo 34.7×, METIS 31.6× (~10% gap);
throughput grows ~linearly in k for all methods, G-TxAllo fastest.
"""
from static_tables import base_parser, print_t4, run_sweep

if __name__ == "__main__":
    args = base_parser(__doc__).parse_args()
    print_t4(run_sweep(args))
