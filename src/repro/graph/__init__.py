"""Graph substrates: numpy edge-list generators, a local COO/CSR graph with
SpMV (the single-core comparator substrate and exact-RWR oracle), and Spark
DataFrame graph operations (the distributed message-passing substrate)."""
