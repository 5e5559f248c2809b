"""Table I — dataset statistics: paper counts vs generated JD-lite counts."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import base_parser  # noqa: E402

from repro.eval.tables import format_markdown, table1_rows  # noqa: E402

if __name__ == "__main__":
    args = base_parser(__doc__).parse_args()
    print("## Table I — statistics of datasets (paper vs JD-lite @ scale)")
    print(format_markdown(table1_rows(scale=args.scale, seed=args.seed)))
