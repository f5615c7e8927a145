"""Pattern-oblivious baseline systems (Arabesque/RStream/Fractal/G-Miner stand-ins)."""
