"""Reproduce the §9 headline pruning ratios (Figs. 1/4/10 summary)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import parser, prod_lake, session  # noqa: E402

from repro import experiments as X  # noqa: E402


def main() -> None:
    args = parser(__doc__).parse_args()
    spark = session("table3")
    tables = prod_lake(spark, args)
    ours = X.table3_pruning_ratios(tables, n=args.n or 800, seed=args.seed)
    print("Table 3 — per-technique pruning ratios (§9 headline numbers)")
    print(X.format_table3(ours))
    spark.stop()


if __name__ == "__main__":
    main()
