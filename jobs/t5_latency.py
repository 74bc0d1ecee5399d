"""T5 (paper Figs. 6-7): average and worst-case confirmation latency.

Paper shape: G-TxAllo best average latency (<2 blocks in most settings);
Shard Scheduler best worst-case latency (no overloaded shard).
"""
from static_tables import base_parser, print_t5, run_sweep

if __name__ == "__main__":
    args = base_parser(__doc__).parse_args()
    print_t5(run_sweep(args))
