"""spark-submit entrypoint regenerating table T6 (Zillow service stats)."""
from common import main

from repro.experiments import t6_zillow

if __name__ == "__main__":
    main(t6_zillow, "T6 - Zillow end-to-end service statistics")
