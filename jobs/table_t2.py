"""spark-submit entrypoint regenerating table T2 (MD reranking cost)."""
from common import main

from repro.experiments import t2_md

if __name__ == "__main__":
    main(t2_md, "T2 - MD reranking cost on Blue Nile")
