"""T8 (Fig 6b): per-accepted-sample time in the reuse phase vs the
regular phase of ONLINE-UNION."""
import sys

sys.path.insert(0, ".")
from _common import base_parser  # noqa: E402

from repro.experiments.session import get_spark, print_table  # noqa: E402
from repro.experiments.tables import t8_per_sample  # noqa: E402

if __name__ == "__main__":
    p = base_parser(__doc__)
    p.add_argument("--n", type=int, default=300)
    args = p.parse_args()
    spark = get_spark("t8")
    rows = t8_per_sample(spark, sf=args.sf, n=args.n, seed=args.seed)
    print_table(rows, "T8: per-sample time, reuse vs regular phase (Fig 6b)")
