"""T7 (paper Fig. 9): A-TxAllo throughput evolution vs global gap τ₂.

9:1 history/eval split; τ₁ = one time step. Paper shape: pure A-TxAllo's
throughput decays only slowly over ~200 steps, and the *average*
throughput is essentially flat across τ₂ ∈ {20, 40, 100, 200} steps.
Our stream is shorter, so τ₂ is scaled down (DESIGN.md §6).
"""
import pandas as pd

from _common import base_parser, make_session, print_markdown


def main() -> None:
    ap = base_parser(__doc__)
    ap.add_argument("--k", type=int, default=20)
    ap.add_argument("--eta", type=float, default=2.0)
    ap.add_argument("--step-blocks", type=int, default=2)
    ap.add_argument("--tau2", type=int, nargs="+", default=[2, 4, 10])
    args = ap.parse_args()

    make_session("txallo-t7")  # spark only for parity of env; sim is per-step pandas
    from repro.chain import EthParams, eth_transactions_pandas
    from repro.sim.adaptive import adaptive_simulation

    tx_pdf = eth_transactions_pandas(EthParams(sf=args.sf, seed=args.seed))
    df = adaptive_simulation(
        tx_pdf,
        k=args.k,
        eta=args.eta,
        step_blocks=args.step_blocks,
        tau2_steps=tuple(args.tau2),
    )
    evo = df.pivot(index="step", columns="variant", values="norm_throughput").reset_index()
    evo.columns.name = None
    print_markdown(evo, f"T7a (Fig. 9a) per-step normalized throughput, k={args.k}, η={args.eta:g}")
    avg = (
        df.groupby("variant")["norm_throughput"].mean().rename("avg Λ/λ").reset_index()
    )
    print_markdown(avg, "T7b (Fig. 9b) average throughput per variant")


if __name__ == "__main__":
    main()
