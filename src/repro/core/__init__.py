"""PBC core: field encoders, encoding-length DP, clustering, codec."""
