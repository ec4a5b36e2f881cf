"""RDF substrate: synthetic YAGO2s-lite data, the Parquet triple store,
and the template query miner."""
