"""Fig. 6 data — EnsemFDet (truncating point) vs EnsemFDet-FIX-K (k=30)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import base_parser, get_spark  # noqa: E402

from repro.eval.tables import format_markdown, truncation_comparison  # noqa: E402

if __name__ == "__main__":
    args = base_parser(__doc__, default_scale=0.01).parse_args()
    spark = get_spark("fig6")
    print("## Fig. 6 — truncation vs FIX-K")
    print(format_markdown(truncation_comparison(spark, scale=args.scale, seed=args.seed)))
    spark.stop()
