"""Scalability sweeps over z and T (Figures 12–14).

Regenerates a Reddit-profile stream per grid point, replays it, and
reports CELF/MTTS/MTTD query time plus ranked-list maintenance cost —
the paper's claims: query time falls with z (fewer elements per topic),
rises with T (more active elements); update time rises with both but
stays sub-millisecond.
"""
import sys, os
sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import parser, save
from repro.corpus import PROFILES
from repro.eval.efficiency import sweep_scalability


def main() -> None:
    p = parser(__doc__)
    p.add_argument("--n-elements", type=int, default=25_000)
    args = p.parse_args()
    name = args.datasets[0] if args.datasets else "reddit"
    n = args.n_elements if args.scale == "bench" else 3_000
    df = sweep_scalability(PROFILES[name], n_elements=n, seed=args.seed)
    text = df.to_string(index=False)
    print(text)
    print("saved:", save(f"scalability_{args.scale}.txt", text + "\n"))


if __name__ == "__main__":
    main()
