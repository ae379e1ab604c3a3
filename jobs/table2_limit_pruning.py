"""Reproduce Table 2: LIMIT-pruning applicability breakdown."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import parser, prod_lake, session  # noqa: E402

from repro import experiments as X  # noqa: E402


def main() -> None:
    args = parser(__doc__).parse_args()
    spark = session("table2")
    tables = prod_lake(spark, args)
    ours = X.table2_limit_breakdown(tables, n=args.n or 1_000, seed=args.seed)
    print("Table 2 — LIMIT pruning applicability (% of LIMIT queries)")
    print(X.format_table2(ours))
    spark.stop()


if __name__ == "__main__":
    main()
