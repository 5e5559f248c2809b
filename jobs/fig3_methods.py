"""Fig. 3/4 data — best-F1 operating points for all five methods, all datasets."""
import sys
from pathlib import Path

import pandas as pd

sys.path.insert(0, str(Path(__file__).parent))
from _common import base_parser, get_spark  # noqa: E402

from repro.eval.tables import PRESETS, format_markdown, method_comparison  # noqa: E402

if __name__ == "__main__":
    args = base_parser(__doc__, default_scale=0.01).parse_args()
    spark = get_spark("fig3")
    out = pd.concat(
        [method_comparison(spark, p, scale=args.scale, seed=args.seed) for p in PRESETS],
        ignore_index=True,
    )
    print("## Fig. 3 — performance comparison of different methods (best F1 point)")
    print(format_markdown(out))
    spark.stop()
