"""Fig. 9 data — full voting-threshold sweep (S=0.1, N=80)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import base_parser, get_spark  # noqa: E402

from repro.eval.tables import format_markdown, threshold_analysis  # noqa: E402

if __name__ == "__main__":
    args = base_parser(__doc__, default_scale=0.01).parse_args()
    spark = get_spark("fig9")
    print("## Fig. 9 — impact of T (S=0.1, N=80)")
    print(format_markdown(threshold_analysis(spark, scale=args.scale, seed=args.seed)))
    spark.stop()
