"""Paper Table 3: Pre-processing time [sec]: reproduced via the Spark pipeline at bench scale."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import make_parser, emit, get_spark, apply_n_override
from repro.harness import tables as T

if __name__ == "__main__":
    args = make_parser(__doc__).parse_args()
    apply_n_override(args.n)
    spark = get_spark("preprocessing")
    emit(T.render(T.table3(spark, args.datasets), "Table 3: Pre-processing time [sec]"), args.out)
    spark.stop()
