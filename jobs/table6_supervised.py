"""Table 6 + Fig 11: supervised matching F1 and train/test times."""
import sys

from repro.harness import table6

if __name__ == "__main__":
    sample = float(sys.argv[sys.argv.index("--sample") + 1]) if "--sample" in sys.argv else 1.0
    print(table6(sample=sample).to_string(index=False))
