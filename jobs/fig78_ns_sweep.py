"""Fig. 7/8 data — impact of N (fixed S) and of S (fixed R = S·N)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import base_parser, get_spark  # noqa: E402

from repro.eval.tables import format_markdown, n_sweep, s_sweep  # noqa: E402

if __name__ == "__main__":
    args = base_parser(__doc__, default_scale=0.01).parse_args()
    spark = get_spark("fig78")
    print("## Fig. 7 — impact of N (S=0.1)")
    print(format_markdown(n_sweep(spark, scale=args.scale, seed=args.seed)))
    print()
    print("## Fig. 8 — impact of S (R=1)")
    print(format_markdown(s_sweep(spark, scale=args.scale, seed=args.seed)))
    spark.stop()
