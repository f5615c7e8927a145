"""Graph substrate: generators and Table 2 datasets."""
