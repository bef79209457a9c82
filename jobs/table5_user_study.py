"""Table 5 — user-study proxy panel (Spark job).

20 trending-topic queries per dataset, k = 5; representativeness and
impact proxies min-max mapped to 1–5 per query across the five methods
(see ``repro.eval.table5`` for the substitution rationale).
"""
import sys, os
sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

import pandas as pd

from _common import parser, save, session, stream_for
from repro.eval.table5 import table5_user_study


def main() -> None:
    args = parser(__doc__).parse_args()
    spark = session("table5")
    frames = []
    for name in args.datasets:
        stream, state = stream_for(name, args)
        frames.append(table5_user_study(spark, stream, state, n_queries=20, k=5))
    df = pd.concat(frames, ignore_index=True)
    text = df.to_string(index=False)
    print(text)
    print("saved:", save(f"table5_{args.scale}.txt", text + "\n"))


if __name__ == "__main__":
    main()
