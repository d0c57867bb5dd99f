"""NEXMark substrate: synthetic auction-platform streams (Person, Auction,
Bid + static Category), the paper's §4 running example, and the benchmark
queries implemented over the TVR engine."""
