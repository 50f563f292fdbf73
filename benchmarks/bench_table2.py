"""Benchmark for Table 2: the FlightData bias-removing rewriting
(Listing 2) that resolves the Simpson reversal of paper Fig. 1."""
from repro.core.rewrite import avg_col, rewrite_total


def test_bench_table2_flight_rewrite(benchmark, bench_flight_df):
    def run():
        return (
            rewrite_total(bench_flight_df, "Carrier", ["Delayed"], ["Airport", "Year"])
            .toPandas()
            .set_index("Carrier")[avg_col("Delayed")]
        )

    adj = benchmark.pedantic(run, rounds=3, iterations=1)
    assert adj["AA"] > adj["UA"]  # reversal present
