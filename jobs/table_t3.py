"""spark-submit entrypoint regenerating table T3 (index amortisation)."""
from common import main

from repro.experiments import t3_index

if __name__ == "__main__":
    main(t3_index, "T3 - on-the-fly dense-region index amortisation")
