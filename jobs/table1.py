"""Print Table 1 (benchmarks x input sizes)."""
from repro.experiments import table1

if __name__ == "__main__":
    print(table1.run().to_string(index=False))
