"""spark-submit entrypoint regenerating table T1 (1-D reranking cost)."""
from common import main

from repro.experiments import t1_onedim

if __name__ == "__main__":
    main(t1_onedim, "T1 - 1D reranking cost by algorithm and correlation")
