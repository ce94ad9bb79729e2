"""spark-submit entrypoint regenerating table T5 (Fig. 2 parallelism)."""
from common import main

from repro.experiments import t5_parallel

if __name__ == "__main__":
    main(t5_parallel, "T5 - parallel queries per iteration (Fig. 2)")
