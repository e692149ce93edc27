"""Paper Table 2: default parameters (r, k) and measured outlier ratio."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import make_parser, emit, apply_n_override
from repro.harness import tables as T

if __name__ == "__main__":
    args = make_parser(__doc__).parse_args()
    apply_n_override(args.n)
    emit(T.render(T.table2(args.datasets), "Table 2: Default parameters"),
         args.out)
