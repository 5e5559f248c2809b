"""Fig. 5 data — sampling-method comparison on dataset 3 (S=0.1, R=8).

Two degree profiles are run: the JD-lite default, and a "paper-like"
profile (low pin degree, high merchant degree — the paper's
D_avg(Merchant) ≫ D_avg(PIN) setting of §V-C2) which reproduces the
mechanism behind their ONS-PIN-worst finding.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import base_parser, get_spark  # noqa: E402

from repro.eval.tables import format_markdown, sampling_comparison  # noqa: E402

if __name__ == "__main__":
    args = base_parser(__doc__, default_scale=0.01).parse_args()
    spark = get_spark("fig5")
    print("## Fig. 5 — sampling methods (jd3, S=0.1, R=8) — default profile")
    print(format_markdown(sampling_comparison(spark, scale=args.scale, seed=args.seed)))
    print()
    print("## Fig. 5 — paper-like degree profile (low pin degree, high merchant degree)")
    print(
        format_markdown(
            sampling_comparison(
                spark,
                scale=args.scale,
                seed=args.seed,
                generator_kwargs=dict(fraud_edges_per_user=4, block_merchant_degree=50),
            )
        )
    )
    spark.stop()
