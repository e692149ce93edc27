"""Paper Table 4: decomposed pre-processing time on Glove [sec]."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import make_parser, emit, get_spark, apply_n_override
from repro.harness import tables as T

if __name__ == "__main__":
    args = make_parser(__doc__).parse_args()
    apply_n_override(args.n)
    spark = get_spark("decomposed_build")
    emit(T.render(T.table4(spark),
                  "Table 4: Decomposed pre-processing on Glove [sec]"),
         args.out)
    spark.stop()
