"""Print Table 1: the language-model registry."""
from repro.harness import table1

if __name__ == "__main__":
    print(table1().to_string(index=False))
