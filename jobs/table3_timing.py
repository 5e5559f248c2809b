"""Table III — running time: EnsemFDet (S=0.1, N=80) vs FRAUDAR (K=30)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import base_parser, get_spark  # noqa: E402

from repro.eval.tables import format_markdown, table3_rows  # noqa: E402

if __name__ == "__main__":
    p = base_parser(__doc__)
    p.add_argument("--s", type=float, default=0.1)
    p.add_argument("--n", type=int, default=80)
    p.add_argument("--k-fraudar", type=int, default=30)
    args = p.parse_args()
    spark = get_spark("table3")
    rows = table3_rows(
        spark, scale=args.scale, s=args.s, n=args.n, k_fraudar=args.k_fraudar, seed=args.seed
    )
    print("## Table III — time consumption EnsemFDet vs FRAUDAR")
    print(format_markdown(rows))
    spark.stop()
