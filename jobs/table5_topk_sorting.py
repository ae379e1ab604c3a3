"""Reproduce Fig. 8 (as a table): processing order vs top-k pruning."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import parser, prod_lake, session  # noqa: E402

from repro import experiments as X  # noqa: E402


def main() -> None:
    args = parser(__doc__).parse_args()
    spark = session("table5")
    tables = prod_lake(spark, args)
    ours = X.table5_topk_sorting(tables, n=args.n or 150, seed=args.seed)
    print("Table 5 — top-k pruning ratio by partition processing order")
    print(X.format_table5(ours))
    spark.stop()


if __name__ == "__main__":
    main()
